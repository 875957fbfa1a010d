"""Benchmarks for Figs 1/16/17/18: key-count migrations per strategy
(scaled parameterisations of the sweep jobs)."""
import pytest

from repro.microbench.migration import migrate_once
from repro.timely.cost import CostModel


def cost():
    return CostModel(workers=8, workers_per_process=4)


def one(strategy, nominal_keys=512e6, n_bins=256):
    run, rec = migrate_once(
        nominal_keys=nominal_keys,
        n_bins=n_bins,
        strategy=strategy,
        rate=500e3,
        warmup_s=0.4,
        post_s=0.3,
        cost=cost(),
    )
    return rec


@pytest.mark.parametrize("strategy", ["all_at_once", "batched", "fluid"])
def test_bench_fig16_migration_strategy(benchmark, strategy):
    rec = benchmark.pedantic(one, args=(strategy,), rounds=1, iterations=1)
    assert rec.completed_s is not None


def test_bench_fig17_domain_scaling(benchmark):
    rec = benchmark.pedantic(
        one, args=("batched", 2048e6, 256), rounds=1, iterations=1
    )
    assert rec.duration_s > 0


def test_bench_fig18_proportional(benchmark):
    rec = benchmark.pedantic(
        one, args=("batched", 1024e6, 512), rounds=1, iterations=1
    )
    assert rec.completed_s is not None


def test_bench_fig1_headline_fluid_beats_all_at_once(benchmark):
    def both():
        aao = one("all_at_once", 1e9, 256)
        fl = one("fluid", 1e9, 256)
        return aao, fl

    aao, fl = benchmark.pedantic(both, rounds=1, iterations=1)
    # the paper's headline: fluid max latency orders of magnitude lower
    assert fl.max_latency_s * 5 < aao.max_latency_s
