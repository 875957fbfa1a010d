"""Fig 16 (table form) — migration max-latency vs duration as the bin count
varies, key-count with a fixed domain of 4096x10^6 keys."""
from _runner import run

TITLE = "Fig 16: key-count migration latency vs duration, varying bin count (4096e6 keys)"


def main(quick: bool = False):
    from repro.microbench.migration import migration_sweep_bins

    rows = migration_sweep_bins(
        nominal_keys=4096e6,
        rate=1e6,
        log_bins=[4, 6, 8, 10, 12, 14] if not quick else [6, 10],
    )
    return rows, [
        "log_bins",
        "strategy",
        "duration_s",
        "max_latency_ms",
        "steps",
        "moves",
    ]


if __name__ == "__main__":
    run(TITLE, main)
