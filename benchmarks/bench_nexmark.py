"""Benchmarks for Figs 5-12: NEXMark queries under migration (scaled)."""
import pytest

from repro.nexmark.stream import run_nexmark
from repro.timely.cost import CostModel


def one(query, strategy="batched"):
    return run_nexmark(
        query=query,
        impl="megaphone",
        n_events=20_000,
        rate_per_s=10_000,
        n_bins=256,
        cost=CostModel(workers=8, workers_per_process=4),
        migrations=[{"at_s": 1.0, "moves": "imbalance", "strategy": strategy}],
    )


@pytest.mark.parametrize("query", ["q1", "q3", "q4", "q5", "q7", "q8"])
def test_bench_nexmark_migrating_query(benchmark, query):
    r = benchmark.pedantic(one, args=(query,), rounds=1, iterations=1)
    assert r.migrations[0].completed_s is not None


def test_bench_nexmark_native_q4(benchmark):
    def go():
        return run_nexmark(
            query="q4",
            impl="native",
            n_events=20_000,
            rate_per_s=10_000,
            n_bins=256,
            cost=CostModel(workers=8, workers_per_process=4),
        )

    r = benchmark.pedantic(go, rounds=1, iterations=1)
    assert r.results
