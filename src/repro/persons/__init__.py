"""Synthetic person-data substrate (GeCo-style generator + corruptor)."""
from repro.persons.corruptor import corrupt_dob, corrupt_records, corrupt_string
from repro.persons.databases import database_pair, multi_databases, records_from_entities
from repro.persons.generator import QID_FIELDS, generate_entities

__all__ = [
    "QID_FIELDS",
    "corrupt_dob",
    "corrupt_records",
    "corrupt_string",
    "database_pair",
    "generate_entities",
    "multi_databases",
    "records_from_entities",
]
