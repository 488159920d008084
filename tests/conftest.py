"""Test-scope tweaks: keep tiny iterative Spark jobs low-latency."""
import os

os.environ.setdefault("SPARK_SHUFFLE_PARTITIONS", "8")
