"""Provided synth_data module + the influence-graph extension."""
import pytest
from pyspark.sql import functions as F

from repro import synth_data
from repro.oracle import assert_equivalent


def test_influence_edges_karate(spark):
    df = synth_data.influence_edges(spark, network="Karate", setting="UC_0.1")
    assert set(df.columns) == {"src", "dst", "p"}
    assert df.count() == 156
    assert df.select("p").distinct().collect()[0]["p"] == 0.1


def test_influence_edges_iwc(spark):
    df = synth_data.influence_edges(spark, network="BA_s", setting="IWC")
    sums = df.groupBy("dst").agg(F.sum("p").alias("s")).collect()
    assert all(abs(r["s"] - 1.0) < 1e-9 for r in sums)


def test_tpch_lineitem_oracle_roundtrip(spark):
    # The provided TPC-H-lite generators still work with the DuckDB oracle
    # (plumbing check: Spark agg == DuckDB agg on identical input).
    li = synth_data.lineitem(spark, sf=0.001, seed=0)
    got = li.groupBy("l_returnflag").agg(
        F.count("*").alias("cnt"), F.round(F.sum("l_quantity"), 2).alias("qty")
    )
    assert_equivalent(
        got,
        """
        SELECT l_returnflag, COUNT(*) AS cnt,
               ROUND(SUM(l_quantity), 2) AS qty
        FROM li GROUP BY l_returnflag
        """,
        li=li,
    )


def test_zipf_keys_skewed(spark):
    df = synth_data.zipf_keys(spark, n=5000, n_keys=100)
    top = (
        df.groupBy("k").count().orderBy(F.desc("count")).limit(1).collect()
    )
    assert top[0]["count"] > 5000 / 100 * 5  # head key ≫ uniform share
