"""Benchmark for Table 1: LOC analysis of the NEXMark implementations."""
from repro.nexmark.loc import loc_table


def test_bench_table1_loc(benchmark):
    rows = benchmark(loc_table)
    assert len(rows) == 8
    stateful = [r for r in rows if r["query"] in ("Q3", "Q4", "Q5", "Q6", "Q8")]
    # the paper's claim: Megaphone's interface needs less code for stateful
    # queries than the hand-written native operators
    assert all(r["megaphone_loc"] < r["native_loc"] for r in stateful)
