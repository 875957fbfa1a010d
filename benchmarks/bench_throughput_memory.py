"""Benchmarks for Figs 19 (throughput vs latency) and 20 (memory)."""
import numpy as np

from repro.microbench.count import run_count
from repro.microbench.migration import migrate_once
from repro.timely.cost import CostModel


def cost():
    return CostModel(workers=8, workers_per_process=4)


def test_bench_fig19_high_rate_steady(benchmark):
    def go():
        return run_count(
            impl="megaphone",
            flavour="key",
            nominal_keys=2048e6,
            n_bins=512,
            rate=8e6,
            duration_s=1.0,
            warmup_s=0.25,
            cost=cost(),
            initial_imbalanced=True,
        )

    r = benchmark.pedantic(go, rounds=1, iterations=1)
    assert r.steady.total > 0


def test_bench_fig20_memory_sampling(benchmark):
    def go():
        return migrate_once(
            nominal_keys=2e9,
            n_bins=512,
            strategy="all_at_once",
            rate=500e3,
            warmup_s=0.4,
            post_s=0.3,
            cost=cost(),
            sample_memory=True,
        )

    run, rec = benchmark.pedantic(go, rounds=1, iterations=1)
    samples = np.array([s[1] for s in run.memory_samples])
    assert samples.max() > 0
