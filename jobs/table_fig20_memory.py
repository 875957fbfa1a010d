"""Fig 20 (table form) — per-process memory during migration per strategy
(16x10^9 keys, 4096 bins): all-at-once allocates ~the moved state extra,
fluid/batched stay flat."""
from _runner import run

TITLE = "Fig 20: memory per process during key-count migration (16e9 keys)"


def main(quick: bool = False):
    from repro.microbench.migration import memory_experiment

    rows = memory_experiment(
        nominal_keys=16e9 if not quick else 2e9,
        n_bins=4096 if not quick else 1024,
        rate=1e6,
    )
    return rows, ["strategy", "steady_gib", "peak_gib", "extra_gib", "duration_s"]


if __name__ == "__main__":
    run(TITLE, main)
