"""Benchmark fixtures: small parameterisations of each table's experiment.

Benchmarks are *scaled-down* versions of the jobs in ``jobs/`` (the full
parameterisations run for minutes each); each benchmark exercises the same
code path as its table and records its runtime via pytest-benchmark.
"""
import sys
from pathlib import Path

sys.path.insert(0, str(Path(__file__).resolve().parents[1]))

from conftest import spark  # noqa: E402,F401  (session Spark fixture)
