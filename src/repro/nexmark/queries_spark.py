"""Ground-truth NEXMark queries Q1–Q8 in Spark SQL / DataFrame form.

These batch implementations over the (persons, auctions, bids) relations
define the *correct outputs* of each standing query; the streaming
implementations (native and Megaphone, on the simulated runtime) are tested
against them, and these in turn are tested against DuckDB SQL via the
oracle, so a broken join or window never passes as "it ran".

Windowed queries use scaled window sizes (the paper time-dilates Q5/Q8 for
the same reason); window parameters are explicit arguments.
"""
from __future__ import annotations

import pyspark.sql.functions as F
from pyspark.sql import DataFrame

DOLLAR_TO_EUR = 0.908
HOT_STATES = ("OR", "ID", "CA")
Q3_CATEGORY = 10 - 3  # category 7 in our 0..9 space (paper uses 10)


def q1_currency(bids: DataFrame) -> DataFrame:
    """Q1: map — convert bid prices from dollars to euros."""
    return bids.select(
        "auction", "bidder", (F.col("price") * DOLLAR_TO_EUR).alias("price_eur"), "ts_ms"
    )


def q2_filter(bids: DataFrame, modulo: int = 123) -> DataFrame:
    """Q2: filter — bids on auctions whose id is divisible by ``modulo``."""
    return bids.filter(F.col("auction") % modulo == 0).select("auction", "price")


def q3_join(persons: DataFrame, auctions: DataFrame) -> DataFrame:
    """Q3: incremental join — local auctions (category) by persons in
    OR/ID/CA."""
    p = persons.filter(F.col("state").isin(*HOT_STATES))
    a = auctions.filter(F.col("category") == Q3_CATEGORY)
    return p.join(a, p.id == a.seller).select(
        "name", "city", "state", a.id.alias("auction_id")
    )


def closed_auctions(auctions: DataFrame, bids: DataFrame) -> DataFrame:
    """Auctions with their winning (highest valid) bid: the shared prefix of
    Q4 and Q6. A bid is valid if placed within [open, expires)."""
    joined = bids.join(auctions, bids.auction == auctions.id).filter(
        (bids.ts_ms >= auctions.ts_ms) & (bids.ts_ms < F.col("expires_ms"))
    )
    return joined.groupBy(
        auctions.id.alias("auction_id"), "seller", "category", "expires_ms"
    ).agg(F.max("price").alias("final_price"))


def q4_avg_closing_price(auctions: DataFrame, bids: DataFrame) -> DataFrame:
    """Q4: average closing price of auctions per category."""
    closed = closed_auctions(auctions, bids)
    return closed.groupBy("category").agg(
        F.avg("final_price").alias("avg_price")
    )


def q5_hot_items(bids: DataFrame, *, window_ms: int = 10_000, slide_ms: int = 2_000) -> DataFrame:
    """Q5: per sliding window, the auction(s) with the most bids.

    A bid at t counts toward every window whose span [w*slide, w*slide+size)
    contains t; windows are indexed by their end slide.
    """
    n_hops = window_ms // slide_ms
    hop = (F.col("ts_ms") / slide_ms).cast("long")
    hopped = bids.withColumn("hop", hop).withColumn(
        "w", F.explode(F.sequence(F.col("hop"), F.col("hop") + n_hops - 1))
    )
    counts = hopped.groupBy("w", "auction").agg(F.count("*").alias("cnt"))
    max_counts = (
        counts.groupBy("w")
        .agg(F.max("cnt").alias("max_cnt"))
        .withColumnRenamed("w", "mw")
    )
    return counts.join(
        max_counts,
        (F.col("w") == F.col("mw")) & (F.col("cnt") == F.col("max_cnt")),
    ).select(F.col("w").alias("window"), "auction", "cnt")


def q6_avg_seller_price(
    auctions: DataFrame, bids: DataFrame, *, last_n: int = 10
) -> DataFrame:
    """Q6: average of the last ``last_n`` closing prices per seller."""
    from pyspark.sql import Window

    closed = closed_auctions(auctions, bids)
    w = Window.partitionBy("seller").orderBy(
        F.col("expires_ms").desc(), F.col("auction_id").desc()
    )
    recent = closed.withColumn("rn", F.row_number().over(w)).filter(
        F.col("rn") <= last_n
    )
    return recent.groupBy("seller").agg(F.avg("final_price").alias("avg_price"))


def q7_highest_bid(bids: DataFrame, *, window_ms: int = 10_000) -> DataFrame:
    """Q7: the highest bid in each tumbling window."""
    w = (F.col("ts_ms") / window_ms).cast("long")
    return (
        bids.withColumn("window", w)
        .groupBy("window")
        .agg(F.max("price").alias("max_price"))
    )


def q8_new_sellers(
    persons: DataFrame, auctions: DataFrame, *, window_ms: int = 20_000
) -> DataFrame:
    """Q8: persons who opened an auction in the same tumbling window in which
    they registered (the paper's 12-hour windowed join, scaled)."""
    pw = persons.withColumn("window", (F.col("ts_ms") / window_ms).cast("long"))
    aw = auctions.withColumn("window", (F.col("ts_ms") / window_ms).cast("long"))
    return (
        pw.join(aw, (pw.id == aw.seller) & (pw.window == aw.window))
        .select(pw.id.alias("person_id"), "name", pw.window.alias("w"))
        .distinct()
    )
