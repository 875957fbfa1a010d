"""Table 1 — NEXMark query implementation lines of code (native vs
Megaphone interface)."""
from _runner import run

TITLE = "Table 1: NEXMark query implementations, lines of code"


def main(quick: bool = False):
    from repro.nexmark.loc import loc_table

    rows = loc_table()
    return rows, [
        "query",
        "native_loc",
        "megaphone_loc",
        "paper_native",
        "paper_megaphone",
    ]


if __name__ == "__main__":
    run(TITLE, main)
