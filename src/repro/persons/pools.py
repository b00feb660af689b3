"""Name / place pools for the synthetic person generator.

The paper-world evaluations of PPRL use voter registries (NCVR), census
extracts and hospital registries — all proprietary. The literature's own
standard substitute is a GeCo-style generator (Tran, Vatsalan, Christen,
CIKM'13): sample attribute values from frequency-weighted pools, then corrupt.
This module holds the pools.

Two name pools are kept: a *majority* pool of longer, Anglo-style names and a
*minority* pool of shorter names. Minority names carry fewer q-grams, so a
single typo destroys a larger fraction of their tokens — which is exactly the
mechanism behind the linkage-fairness gap the tutorial flags as open (T9).
"""
from __future__ import annotations

FIRST_NAMES_MAJORITY: list[str] = [
    "william", "elizabeth", "michael", "jennifer", "christopher", "jessica",
    "matthew", "ashley", "joshua", "amanda", "daniel", "sarah", "james",
    "stephanie", "robert", "melissa", "john", "nicole", "joseph", "emily",
    "andrew", "michelle", "ryan", "kimberly", "brandon", "rebecca", "jason",
    "laura", "justin", "samantha", "david", "heather", "anthony", "rachel",
    "richard", "amber", "thomas", "katherine", "jonathan", "megan", "charles",
    "lauren", "nicholas", "christina", "benjamin", "victoria", "alexander",
    "danielle", "patrick", "alexandra", "zachary", "kathleen", "nathaniel",
    "margaret", "jeremiah", "catherine", "sebastian", "gabriella", "theodore",
    "annabelle", "frederick", "josephine", "montgomery", "penelope",
]

LAST_NAMES_MAJORITY: list[str] = [
    "anderson", "thompson", "martinez", "robinson", "rodriguez", "hernandez",
    "williams", "johnson", "mitchell", "campbell", "phillips", "peterson",
    "richardson", "henderson", "stevenson", "harrington", "sutherland",
    "montgomery", "fitzgerald", "cunningham", "oconnell", "armstrong",
    "stafford", "whitfield", "pemberton", "kingsley", "ellington",
    "blackwood", "ashworth", "crawford", "davidson", "eastwood", "fairbanks",
    "galloway", "hathaway", "lancaster", "macallister", "nightingale",
    "ostrowski", "pennington", "quartermaine", "ravensworth", "shepherdson",
    "thackeray", "underwood", "vanderbilt", "wetherington", "yarborough",
]

FIRST_NAMES_MINORITY: list[str] = [
    "li", "wei", "min", "jun", "yan", "mei", "lan", "tao", "jin", "xiu",
    "an", "bo", "yu", "kai", "lei", "ning", "ping", "qing", "rui", "shan",
]

LAST_NAMES_MINORITY: list[str] = [
    "ng", "wu", "li", "xu", "yu", "ho", "lo", "ma", "su", "au",
    "chan", "chen", "wang", "liu", "yang", "zhao", "zhou", "lin", "kim", "lee",
]

CITIES: list[str] = [
    "springfield", "riverton", "fairview", "greenville", "bristol",
    "clinton", "salem", "madison", "georgetown", "arlington", "ashland",
    "burlington", "manchester", "oxford", "clayton", "milton", "auburn",
    "dayton", "lexington", "milford", "newport", "kingston", "dover",
    "hudson", "winchester", "cambridge", "lancaster", "florence", "troy",
    "chester", "marion", "jackson", "franklin", "centerville", "oakland",
    "glendale", "westfield", "brookfield", "hillsboro", "lakeview",
]
