"""Fig 1 (table form) — the headline comparison: migrating one billion keys
(8 GB of state) all-at-once vs fluid vs optimized."""
from _runner import run

TITLE = "Fig 1: migrating 1e9 keys / 8 GB of state, strategy comparison"


def main(quick: bool = False):
    from repro.microbench.migration import headline_comparison

    rows = headline_comparison(
        nominal_keys=1e9, n_bins=4096 if not quick else 512, rate=1e6
    )
    return rows, ["strategy", "duration_s", "max_latency_ms", "steps", "moves"]


if __name__ == "__main__":
    run(TITLE, main)
