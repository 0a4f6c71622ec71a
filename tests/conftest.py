"""Test-local tweaks: fewer shuffle partitions for tiny test data.

The root conftest reads SPARK_SHUFFLE_PARTITIONS when the session fixture
is first built, which happens after this file is imported — so tests run
with 8 partitions unless the caller overrides.
"""
import os

os.environ.setdefault("SPARK_SHUFFLE_PARTITIONS", "8")
