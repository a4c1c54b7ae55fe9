"""Test-session tuning: small shuffle fan-out for tiny iterative fixpoints.

The session fixture in the root conftest honours ``SPARK_SHUFFLE_PARTITIONS``;
the dataflow tests run many short join rounds over KB-sized inputs, where 64
shuffle partitions are pure scheduling overhead. An explicit env setting
still wins.
"""
import os

os.environ.setdefault("SPARK_SHUFFLE_PARTITIONS", "4")
