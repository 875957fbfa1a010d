"""Fig 19 (table form) — offered load vs max latency for steady state and
each migration strategy (16384x10^6 keys, 4096 bins)."""
from _runner import run

TITLE = "Fig 19: offered load vs max latency (16384e6 keys, 4096 bins)"


def main(quick: bool = False):
    from repro.microbench.migration import throughput_sweep

    rows = throughput_sweep(
        nominal_keys=16384e6,
        n_bins=4096,
        rates=[250e3, 1e6, 4e6, 16e6, 32e6] if not quick else [1e6, 16e6],
    )
    return rows, ["rate", "strategy", "max_latency_ms", "duration_s"]


if __name__ == "__main__":
    run(TITLE, main)
