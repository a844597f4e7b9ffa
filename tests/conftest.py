"""Test-suite conftest: tame Spark's fixed overhead for the tiny inputs.

Imported at collection time, before the session fixture in the root
conftest.py instantiates the SparkSession, so the env override below is
seen there. 8 shuffle partitions keeps shuffles real but stops hundreds of
near-empty tasks from dominating wall-clock at unit-test scale.
"""
import os

os.environ.setdefault("SPARK_SHUFFLE_PARTITIONS", "8")
