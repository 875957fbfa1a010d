"""Latency recording and analysis (log-binned histograms, CCDF, percentiles)."""
from repro.latency.histogram import LatencyHistogram, percentile_table

__all__ = ["LatencyHistogram", "percentile_table"]
