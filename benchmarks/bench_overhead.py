"""Benchmarks for Figs 13b/14b/15b: interface-overhead runs (scaled)."""
import pytest

from repro.microbench.overhead import overhead_row
from repro.timely.cost import CostModel


def cost():
    return CostModel(workers=8, workers_per_process=4)


def run_row(flavour, impl, log_bins, nominal_keys):
    return overhead_row(
        flavour=flavour,
        impl=impl,
        log_bins=log_bins,
        nominal_keys=nominal_keys,
        rate=1e6,
        duration_s=1.0,
        warmup_s=0.25,
        cost=cost(),
    )


def test_bench_fig13b_hash_count(benchmark):
    row = benchmark.pedantic(
        run_row, args=("hash", "megaphone", 12, 256e6), rounds=2, iterations=1
    )
    assert row["records"] > 0


def test_bench_fig14b_key_count(benchmark):
    row = benchmark.pedantic(
        run_row, args=("key", "megaphone", 12, 256e6), rounds=2, iterations=1
    )
    assert row["records"] > 0


def test_bench_fig15b_key_count_large_domain(benchmark):
    row = benchmark.pedantic(
        run_row, args=("key", "megaphone", 12, 8192e6), rounds=2, iterations=1
    )
    assert row["records"] > 0


def test_bench_native_baseline(benchmark):
    row = benchmark.pedantic(
        run_row, args=("key", "native", None, 256e6), rounds=2, iterations=1
    )
    assert row["experiment"] == "Native"


@pytest.mark.parametrize("log_bins", [8, 16])
def test_bench_overhead_scales_with_bins(benchmark, log_bins):
    row = benchmark.pedantic(
        run_row, args=("key", "megaphone", log_bins, 256e6), rounds=1, iterations=1
    )
    assert row["p90_ms"] > 0
