"""Test-tier Spark tuning: tiny data -> few shuffle partitions.

Must run before the session fixture in the root conftest instantiates
the SparkSession (pytest imports this conftest at collection time,
well before any fixture runs).
"""
import os

os.environ.setdefault("SPARK_SHUFFLE_PARTITIONS", "8")
