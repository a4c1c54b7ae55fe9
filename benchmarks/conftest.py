"""Benchmark-session tuning (same rationale as tests/conftest.py)."""
import os

os.environ.setdefault("SPARK_SHUFFLE_PARTITIONS", "4")
