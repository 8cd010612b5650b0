"""Benchmark-suite configuration: small shuffle partitioning for the small
benchmark graphs (must be set before the root conftest's fixture creates
the session)."""
import os

os.environ.setdefault("SPARK_SHUFFLE_PARTITIONS", "8")
