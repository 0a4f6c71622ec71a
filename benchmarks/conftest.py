"""Benchmark-local settings: modest shuffle partitions for small inputs."""
import os

os.environ.setdefault("SPARK_SHUFFLE_PARTITIONS", "8")
