"""Fig 17 (table form) — migration max-latency vs duration as the domain
size varies, key-count with 4096 bins."""
from _runner import run

TITLE = "Fig 17: key-count migration latency vs duration, varying domain (4096 bins)"


def main(quick: bool = False):
    from repro.microbench.migration import migration_sweep_keys

    rows = migration_sweep_keys(
        n_bins=4096,
        rate=1e6,
        nominal_keys_list=(
            [256e6, 512e6, 1024e6, 2048e6, 4096e6, 8192e6]
            if not quick
            else [256e6, 2048e6]
        ),
    )
    return rows, [
        "nominal_keys",
        "strategy",
        "duration_s",
        "max_latency_ms",
        "steps",
        "moves",
    ]


if __name__ == "__main__":
    run(TITLE, main)
