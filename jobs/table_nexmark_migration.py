"""Figs 5–12 (table form) — NEXMark queries under migration: steady p99 and
the maximum latency during an all-at-once vs a batched migration."""
from _runner import run

TITLE = "Figs 5-12: NEXMark migration, all-at-once vs batched (scaled stream)"


def main(quick: bool = False):
    from repro.nexmark.bench import nexmark_migration_table

    rows = nexmark_migration_table(
        queries=None if not quick else ["q1", "q4"],
        n_events=120_000 if not quick else 30_000,
        rate_per_s=10_000,
        n_bins=1024 if not quick else 256,
        migrate_at_s=8.0 if not quick else 2.0,
    )
    return rows, [
        "query",
        "steady_p99_ms",
        "all_at_once_max_ms",
        "batched_max_ms",
        "all_at_once_duration_s",
        "batched_duration_s",
    ]


if __name__ == "__main__":
    run(TITLE, main)
