"""Fig 13(b) — hash-count overhead percentiles, 256x10^6 keys at
4x10^6 updates/s, log bin counts 4..20 plus Native."""
from _runner import run

TITLE = "Fig 13b: hash-count overhead (256e6 keys, 4e6 rec/s), latency ms"


def main(quick: bool = False):
    from repro.microbench.overhead import overhead_table

    rows = overhead_table(
        flavour="hash",
        nominal_keys=256e6,
        rate=4e6 if not quick else 1e6,
        duration_s=5.0 if not quick else 1.5,
        log_bins=None if not quick else [8, 12, 16, 20],
    )
    return rows, ["experiment", "p90_ms", "p99_ms", "p9999_ms", "max_ms"]


if __name__ == "__main__":
    run(TITLE, main)
