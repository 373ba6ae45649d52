"""Test-suite Spark tuning.

The sandboxed scheduler has high per-task latency, so the root
conftest's default of 64 shuffle partitions makes tiny test queries take
minutes. The root fixture reads ``SPARK_SHUFFLE_PARTITIONS`` lazily when
the session is created; setting it here (conftests import before any
fixture runs) scales the shuffle width down to test-sized data without
modifying the provided root conftest.
"""
import os

os.environ.setdefault("SPARK_SHUFFLE_PARTITIONS", "8")
