"""Unit tests for Table 1 LOC counting and markdown table rendering."""
from repro.nexmark.loc import PAPER_TABLE1, count_loc, loc_table
from repro.tables import fmt, markdown_table


class TestCountLoc:
    def test_excludes_docstrings_comments_blanks(self):
        def sample():
            """A docstring
            spanning lines."""
            x = 1  # trailing comment counts as code
            # pure comment
            return x

        assert count_loc(sample) == 3  # def, x = 1, return

    def test_class_docstrings_excluded(self):
        class C:
            """Doc."""

            def m(self):
                """Doc."""
                return 1

        assert count_loc(C) == 3  # class, def, return


class TestLocTable:
    def test_all_queries_present(self):
        rows = loc_table()
        assert [r["query"] for r in rows] == [f"Q{i}" for i in range(1, 9)]

    def test_paper_numbers_recorded(self):
        rows = loc_table()
        for r in rows:
            q = r["query"].lower()
            assert r["paper_native"] == PAPER_TABLE1[q]["native"]

    def test_stateful_queries_megaphone_smaller(self):
        # the paper's Table 1 claim for the stateful queries
        for r in loc_table():
            if r["query"] in ("Q3", "Q4", "Q5", "Q6", "Q8"):
                assert r["megaphone_loc"] < r["native_loc"], r


class TestMarkdown:
    def test_fmt(self):
        assert fmt(None) == "-"
        assert fmt(0.0) == "0"
        assert fmt(12345.6) == "12,346"
        assert fmt(12.34) == "12.3"
        assert fmt(1.234) == "1.23"
        assert fmt("x") == "x"

    def test_table_render(self):
        md = markdown_table([{"a": 1, "b": 2.5}, {"a": 3, "b": None}])
        lines = md.splitlines()
        assert lines[0] == "| a | b |"
        assert lines[2] == "| 1 | 2.50 |"
        assert lines[3] == "| 3 | - |"

    def test_empty(self):
        assert markdown_table([]) == "(no rows)"
