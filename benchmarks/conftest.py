"""Benchmark session config: small shuffle partitioning for local frames."""
import os

os.environ.setdefault("SPARK_SHUFFLE_PARTITIONS", "8")
