"""Test-scope Spark tuning.

Loaded by pytest before the session ``spark`` fixture (root conftest)
instantiates: the unit tests run on graphs of tens of nodes, where 64
shuffle partitions are pure scheduler overhead. The root conftest reads
``SPARK_SHUFFLE_PARTITIONS`` from the environment, so defaulting it here
keeps the provided fixture untouched while making the suite ~3x faster.
"""
import os

os.environ.setdefault("SPARK_SHUFFLE_PARTITIONS", "8")
