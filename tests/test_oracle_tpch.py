"""Integration sanity for the provided substrate: TPC-H-lite generators +
the DuckDB oracle over genuinely shuffled Spark plans (broadcast joins are
disabled by the session fixture), and the oracle's own failure mode."""
import pytest

from repro import synth_data
from repro.oracle import assert_equivalent


@pytest.fixture(scope="module")
def li(spark):
    return synth_data.lineitem(spark, sf=0.005)


@pytest.fixture(scope="module")
def od(spark):
    return synth_data.orders(spark, sf=0.005)


class TestTpchLite:
    def test_aggregate_pushdown_shape(self, spark, li):
        got = li.groupBy("l_returnflag").count().withColumnRenamed("count", "n")
        assert_equivalent(
            got,
            "SELECT l_returnflag, COUNT(*) AS n FROM li GROUP BY l_returnflag",
            li=li,
        )

    def test_join_through_shuffle(self, spark, li, od):
        got = (
            li.join(od, li.l_orderkey == od.o_orderkey)
            .groupBy("o_orderpriority")
            .count()
            .withColumnRenamed("count", "n")
        )
        assert_equivalent(
            got,
            """
            SELECT o_orderpriority, COUNT(*) AS n
            FROM li JOIN od ON l_orderkey = o_orderkey
            GROUP BY o_orderpriority
            """,
            li=li,
            od=od,
        )

    def test_zipf_keys_skewed(self, spark):
        df = synth_data.zipf_keys(spark, n=20000, n_keys=100)
        counts = df.groupBy("k").count().toPandas().sort_values("k")
        assert counts.iloc[0]["count"] > 3 * counts.iloc[-1]["count"]

    def test_oracle_catches_wrong_result(self, spark, li):
        got = li.groupBy("l_returnflag").count().withColumnRenamed("count", "n")
        with pytest.raises(AssertionError):
            assert_equivalent(
                got,
                # Off-by-one oracle: deliberately wrong.
                "SELECT l_returnflag, COUNT(*) + 1 AS n FROM li GROUP BY l_returnflag",
                li=li,
            )

    def test_oracle_catches_column_mismatch(self, spark, li):
        got = li.groupBy("l_returnflag").count()
        with pytest.raises(AssertionError, match="column mismatch"):
            assert_equivalent(
                got,
                "SELECT l_returnflag, COUNT(*) AS n FROM li GROUP BY l_returnflag",
                li=li,
            )
