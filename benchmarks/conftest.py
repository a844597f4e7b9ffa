"""Benchmark conftest: reuse the fast-shuffle setting of the test suite."""
import os

os.environ.setdefault("SPARK_SHUFFLE_PARTITIONS", "8")
