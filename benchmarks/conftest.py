"""Benchmark-scope Spark tuning (see tests/conftest.py)."""
import os

os.environ.setdefault("SPARK_SHUFFLE_PARTITIONS", "8")
