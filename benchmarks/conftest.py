"""Benchmark-session tuning (larger data than tests; moderate parallelism)."""
import os

os.environ.setdefault("SPARK_SHUFFLE_PARTITIONS", "16")
