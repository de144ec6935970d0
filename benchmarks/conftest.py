"""Benchmark-suite tuning (mirrors tests/conftest.py)."""
import os

os.environ.setdefault("SPARK_SHUFFLE_PARTITIONS", "8")
