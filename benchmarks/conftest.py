"""Benchmark defaults: modest shuffle parallelism for ~100 MB-scale inputs
(see tests/conftest.py for rationale; benchmarks use slightly larger data)."""
import os

os.environ.setdefault("SPARK_SHUFFLE_PARTITIONS", "16")
