"""Test-session tuning: shrink shuffle parallelism for tiny test data.

Imported by pytest before the session-scoped ``spark`` fixture (defined in
the root conftest) is instantiated, so the env default set here is picked up
by the builder. 8 partitions ≫ enough for the ≤10^3-row frames used in
tests and cuts per-action scheduling overhead substantially. An explicit
``SPARK_SHUFFLE_PARTITIONS`` from the caller still wins.
"""
import os

os.environ.setdefault("SPARK_SHUFFLE_PARTITIONS", "8")
