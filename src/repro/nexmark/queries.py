"""NEXMark queries over the TVR model (paper §4 + Appendix B workloads).

Each query is a pure ``(spark, **snapshots) -> DataFrame`` function — the
shape the TVR engine evaluates per micro-batch — built exclusively from the
DataFrame API and the Tumble/Hop TVFs, so the whole plan goes through
Catalyst. For every query there is a DuckDB-dialect SQL builder used by the
correctness oracle (``repro.oracle.assert_equivalent``) to check the
point-in-time (table) semantics on identical snapshots.

Q7 — the paper's centerpiece — is written exactly as Listing 2: Tumble the
bids into 10-minute windows, take the per-window MAX price, and join bids
back on (price = max AND bidtime within the window).
"""
from __future__ import annotations

from datetime import timedelta
from typing import Callable

from pyspark.sql import DataFrame, SparkSession
from pyspark.sql import functions as F

from ..core.windows import hop, tumble


def _secs(d: timedelta) -> int:
    return int(d.total_seconds())


# -- Q7: highest-priced bid per tumbling window ----------------------------


def make_q7(dur: timedelta = timedelta(minutes=10)) -> Callable:
    """Listing 2 as a DataFrame program, parameterized by window width."""

    def q7(spark: SparkSession, bid: DataFrame) -> DataFrame:
        tumble_bid = tumble(bid, "bidtime", dur)
        max_bid = tumble_bid.groupBy("wstart", "wend").agg(
            F.max("price").alias("maxprice")
        )
        b, m = bid.alias("b"), max_bid.alias("m")
        return b.join(
            m,
            (F.col("b.price") == F.col("m.maxprice"))
            & (F.col("b.bidtime") >= F.col("m.wend") - F.expr(f"INTERVAL {_secs(dur)} SECOND"))
            & (F.col("b.bidtime") < F.col("m.wend")),
        ).select("m.wstart", "m.wend", "b.bidtime", "b.price", "b.item")

    return q7


def q7_duckdb_sql(dur: timedelta = timedelta(minutes=10)) -> str:
    """DuckDB oracle for Q7's table semantics over a ``bid`` snapshot."""
    d = _secs(dur)
    return f"""
        WITH tb AS (
            SELECT *,
                   time_bucket(INTERVAL '{d} seconds', bidtime) AS wstart,
                   time_bucket(INTERVAL '{d} seconds', bidtime)
                       + INTERVAL '{d} seconds' AS wend
            FROM bid
        ),
        maxbid AS (
            SELECT wstart, wend, MAX(price) AS maxprice
            FROM tb GROUP BY wstart, wend
        )
        SELECT m.wstart AS wstart, m.wend AS wend,
               b.bidtime AS bidtime, b.price AS price, b.item AS item
        FROM bid b, maxbid m
        WHERE b.price = m.maxprice
          AND b.bidtime >= m.wend - INTERVAL '{d} seconds'
          AND b.bidtime < m.wend
    """


# -- Q1: currency conversion (stateless map) -------------------------------

EUR_RATE = 0.908


def q1(spark: SparkSession, bid: DataFrame) -> DataFrame:
    return bid.select(
        "item",
        "bidder",
        (F.col("price") * F.lit(EUR_RATE)).alias("price_eur"),
        "bidtime",
    )


Q1_DUCKDB = f"""
    SELECT item, bidder, price * {EUR_RATE} AS price_eur, bidtime FROM bid
"""


# -- Q2: selection on a set of auctions (stateless filter) -----------------


def make_q2(modulus: int = 123) -> Callable:
    def q2(spark: SparkSession, bid: DataFrame) -> DataFrame:
        return bid.filter(F.col("item") % modulus == 0).select("item", "price")

    return q2


def q2_duckdb_sql(modulus: int = 123) -> str:
    return f"SELECT item, price FROM bid WHERE item % {modulus} = 0"


# -- Q3: local item suggestion (incremental join) --------------------------


def make_q3(category: int = 10, states=("OR", "ID", "CA")) -> Callable:
    def q3(spark: SparkSession, auction: DataFrame, person: DataFrame) -> DataFrame:
        a, p = auction.alias("a"), person.alias("p")
        return (
            a.join(p, F.col("a.seller") == F.col("p.id"))
            .filter(
                (F.col("a.category") == category) & F.col("p.state").isin(*states)
            )
            .select(
                F.col("p.name").alias("name"),
                F.col("p.city").alias("city"),
                F.col("p.state").alias("state"),
                F.col("a.id").alias("auction"),
            )
        )

    return q3


def q3_duckdb_sql(category: int = 10, states=("OR", "ID", "CA")) -> str:
    st = ", ".join(f"'{s}'" for s in states)
    return f"""
        SELECT p.name AS name, p.city AS city, p.state AS state, a.id AS auction
        FROM auction a JOIN person p ON a.seller = p.id
        WHERE a.category = {category} AND p.state IN ({st})
    """


# -- Q5: hot items (hopping-window count, per-window argmax) ---------------


def make_q5(
    dur: timedelta = timedelta(minutes=10), hopsize: timedelta = timedelta(minutes=5)
) -> Callable:
    def q5(spark: SparkSession, bid: DataFrame) -> DataFrame:
        hb = hop(bid, "bidtime", dur, hopsize)
        counts = hb.groupBy("wstart", "wend", "item").agg(
            F.count(F.lit(1)).alias("n_bids")
        )
        maxc = counts.groupBy("wstart", "wend").agg(F.max("n_bids").alias("max_bids"))
        c, m = counts.alias("c"), maxc.alias("m")
        return c.join(
            m,
            (F.col("c.wstart") == F.col("m.wstart"))
            & (F.col("c.wend") == F.col("m.wend"))
            & (F.col("c.n_bids") == F.col("m.max_bids")),
        ).select("c.wstart", "c.wend", "c.item", "c.n_bids")

    return q5


def q5_duckdb_sql(
    dur: timedelta = timedelta(minutes=10), hopsize: timedelta = timedelta(minutes=5)
) -> str:
    """Hop oracle: with hopsize dividing dur, the k = dur/hopsize phase
    windows containing a timestamp are a UNION ALL of shifted time_buckets."""
    d, h = _secs(dur), _secs(hopsize)
    if d % h != 0:
        raise ValueError("oracle requires hopsize to divide dur")
    phases = []
    for i in range(d // h):
        off = i * h
        phases.append(
            f"SELECT *, time_bucket(INTERVAL '{d} seconds', "
            f"bidtime - INTERVAL '{off} seconds') + INTERVAL '{off} seconds' AS wstart "
            f"FROM bid"
        )
    union = " UNION ALL ".join(phases)
    return f"""
        WITH hopped AS ({union}),
        counts AS (
            SELECT wstart, wstart + INTERVAL '{d} seconds' AS wend, item,
                   COUNT(*) AS n_bids
            FROM hopped GROUP BY wstart, item
        ),
        maxc AS (SELECT wstart, wend, MAX(n_bids) AS max_bids
                 FROM counts GROUP BY wstart, wend)
        SELECT c.wstart AS wstart, c.wend AS wend, c.item AS item,
               c.n_bids AS n_bids
        FROM counts c JOIN maxc m
          ON c.wstart = m.wstart AND c.wend = m.wend AND c.n_bids = m.max_bids
    """


# -- Q8: monitor new users (windowed stream-stream join) -------------------


def make_q8(dur: timedelta = timedelta(minutes=20)) -> Callable:
    def q8(spark: SparkSession, person: DataFrame, auction: DataFrame) -> DataFrame:
        tp = tumble(person, "entrytime", dur).alias("p")
        ta = tumble(auction, "atime", dur).alias("a")
        return (
            tp.join(
                ta,
                (F.col("p.id") == F.col("a.seller"))
                & (F.col("p.wstart") == F.col("a.wstart")),
            )
            .select(
                F.col("p.id").alias("id"),
                F.col("p.name").alias("name"),
                F.col("p.wstart").alias("wstart"),
                F.col("p.wend").alias("wend"),
            )
            .distinct()
        )

    return q8


def q8_duckdb_sql(dur: timedelta = timedelta(minutes=20)) -> str:
    d = _secs(dur)
    return f"""
        SELECT DISTINCT p.id AS id, p.name AS name,
               time_bucket(INTERVAL '{d} seconds', p.entrytime) AS wstart,
               time_bucket(INTERVAL '{d} seconds', p.entrytime)
                   + INTERVAL '{d} seconds' AS wend
        FROM person p JOIN auction a ON p.id = a.seller
        WHERE time_bucket(INTERVAL '{d} seconds', p.entrytime)
            = time_bucket(INTERVAL '{d} seconds', a.atime)
    """


# -- windowed aggregate building blocks (Listings 6 and 8) -----------------


def make_tumble_max(dur: timedelta = timedelta(minutes=10)) -> Callable:
    """Listing 6: ``SELECT MAX(price), wstart, wend FROM Tumble(...)
    GROUP BY wend`` (wstart is functionally dependent on wend)."""

    def q(spark: SparkSession, bid: DataFrame) -> DataFrame:
        return (
            tumble(bid, "bidtime", dur)
            .groupBy("wstart", "wend")
            .agg(F.max("price").alias("maxprice"))
        )

    return q


def make_hop_max(
    dur: timedelta = timedelta(minutes=10), hopsize: timedelta = timedelta(minutes=5)
) -> Callable:
    """Listing 8: the hopping-window MAX."""

    def q(spark: SparkSession, bid: DataFrame) -> DataFrame:
        return (
            hop(bid, "bidtime", dur, hopsize)
            .groupBy("wstart", "wend")
            .agg(F.max("price").alias("maxprice"))
        )

    return q
