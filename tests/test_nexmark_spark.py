"""Ground-truth NEXMark queries in Spark, each checked against DuckDB SQL
via the oracle (wrong join/window logic fails here, not just "it ran")."""
import pytest

from repro.nexmark import queries_spark as Q
from repro.nexmark.generator import nexmark_events, split_events
from repro.oracle import assert_equivalent

N_EVENTS = 6000

CLOSED_SQL = """
    SELECT a.id AS auction_id, a.seller, a.category, a.expires_ms,
           MAX(b.price) AS final_price
    FROM bids b JOIN auctions a ON b.auction = a.id
    WHERE b.ts_ms >= a.ts_ms AND b.ts_ms < a.expires_ms
    GROUP BY 1, 2, 3, 4
"""


@pytest.fixture(scope="module")
def relations(spark):
    events = nexmark_events(N_EVENTS, rate_per_s=1000, seed=11)
    p, a, b = split_events(events)
    return {
        "pandas": (p, a, b),
        "spark": (
            spark.createDataFrame(p),
            spark.createDataFrame(a),
            spark.createDataFrame(b),
        ),
    }


class TestNexmarkSparkQueries:
    def test_q1(self, relations):
        _, _, bids = relations["spark"]
        _, _, bids_pd = relations["pandas"]
        assert_equivalent(
            Q.q1_currency(bids),
            "SELECT auction, bidder, price * 0.908 AS price_eur, ts_ms FROM bids",
            bids=bids_pd,
        )

    def test_q2(self, relations):
        _, _, bids = relations["spark"]
        _, _, bids_pd = relations["pandas"]
        assert_equivalent(
            Q.q2_filter(bids),
            "SELECT auction, price FROM bids WHERE auction % 123 = 0",
            bids=bids_pd,
        )

    def test_q3(self, relations):
        persons, auctions, _ = relations["spark"]
        p_pd, a_pd, _ = relations["pandas"]
        assert_equivalent(
            Q.q3_join(persons, auctions),
            """
            SELECT name, city, state, a.id AS auction_id
            FROM persons p JOIN auctions a ON p.id = a.seller
            WHERE p.state IN ('OR','ID','CA') AND a.category = 7
            """,
            persons=p_pd,
            auctions=a_pd,
        )

    def test_closed_auctions(self, relations):
        _, auctions, bids = relations["spark"]
        _, a_pd, b_pd = relations["pandas"]
        assert_equivalent(
            Q.closed_auctions(auctions, bids),
            CLOSED_SQL,
            auctions=a_pd,
            bids=b_pd,
        )

    def test_q4(self, relations):
        _, auctions, bids = relations["spark"]
        _, a_pd, b_pd = relations["pandas"]
        assert_equivalent(
            Q.q4_avg_closing_price(auctions, bids),
            f"""
            WITH closed AS ({CLOSED_SQL})
            SELECT category, AVG(final_price) AS avg_price
            FROM closed GROUP BY category
            """,
            auctions=a_pd,
            bids=b_pd,
        )

    def test_q5(self, relations):
        _, _, bids = relations["spark"]
        _, _, b_pd = relations["pandas"]
        assert_equivalent(
            Q.q5_hot_items(bids, window_ms=10_000, slide_ms=2_000),
            """
            WITH hopped AS (
                SELECT unnest(generate_series(ts_ms // 2000, ts_ms // 2000 + 4)) AS w,
                       auction
                FROM bids
            ),
            counts AS (
                SELECT w, auction, COUNT(*) AS cnt FROM hopped GROUP BY w, auction
            ),
            mx AS (SELECT w, MAX(cnt) AS m FROM counts GROUP BY w)
            SELECT counts.w AS window, counts.auction, counts.cnt AS cnt
            FROM counts JOIN mx ON counts.w = mx.w AND counts.cnt = mx.m
            """,
            bids=b_pd,
        )

    def test_q6(self, relations):
        _, auctions, bids = relations["spark"]
        _, a_pd, b_pd = relations["pandas"]
        assert_equivalent(
            Q.q6_avg_seller_price(auctions, bids, last_n=10),
            f"""
            WITH closed AS ({CLOSED_SQL}),
            ranked AS (
                SELECT seller, final_price,
                       ROW_NUMBER() OVER (
                           PARTITION BY seller
                           ORDER BY expires_ms DESC, auction_id DESC
                       ) AS rn
                FROM closed
            )
            SELECT seller, AVG(final_price) AS avg_price
            FROM ranked WHERE rn <= 10 GROUP BY seller
            """,
            auctions=a_pd,
            bids=b_pd,
        )

    def test_q7(self, relations):
        _, _, bids = relations["spark"]
        _, _, b_pd = relations["pandas"]
        assert_equivalent(
            Q.q7_highest_bid(bids, window_ms=10_000),
            """
            SELECT ts_ms // 10000 AS window, MAX(price) AS max_price
            FROM bids GROUP BY 1
            """,
            bids=b_pd,
        )

    def test_q8(self, relations):
        persons, auctions, _ = relations["spark"]
        p_pd, a_pd, _ = relations["pandas"]
        assert_equivalent(
            Q.q8_new_sellers(persons, auctions, window_ms=20_000),
            """
            SELECT DISTINCT p.id AS person_id, p.name, p.ts_ms // 20000 AS w
            FROM persons p JOIN auctions a
              ON p.id = a.seller AND p.ts_ms // 20000 = a.ts_ms // 20000
            """,
            persons=p_pd,
            auctions=a_pd,
        )
