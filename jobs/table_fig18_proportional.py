"""Fig 18 (table form) — domain and bin count grow proportionally (fixed
4x10^6 keys per bin): fluid/batched max latency stays fixed while duration
grows; all-at-once grows in both."""
from _runner import run

TITLE = "Fig 18: key-count migration, keys & bins proportional (4e6 keys/bin)"


def main(quick: bool = False):
    from repro.microbench.migration import migration_sweep_proportional

    rows = migration_sweep_proportional(
        keys_per_bin=4e6,
        rate=1e6,
        nominal_keys_list=(
            [256e6, 1024e6, 4096e6, 16384e6, 32768e6]
            if not quick
            else [256e6, 4096e6]
        ),
    )
    return rows, [
        "nominal_keys",
        "n_bins",
        "strategy",
        "duration_s",
        "max_latency_ms",
    ]


if __name__ == "__main__":
    run(TITLE, main)
