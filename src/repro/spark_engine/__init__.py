"""Megaphone's mechanism expressed over Spark DataFrames: keyed operator
state lives in a Spark DataFrame hash-partitioned by (logical) worker, a
timestamped bin→worker routing table routes both input and state, and a
migration step physically repartitions the chosen bins' state rows through a
real Spark shuffle — all-at-once, batched, or fluid granularity."""
from repro.spark_engine.engine import SparkMigratableCount
from repro.spark_engine.experiment import migration_timeline

__all__ = ["SparkMigratableCount", "migration_timeline"]
