"""Oracle integration: the Spark butterfly pipeline on TPC-H-lite data.

The provided ``synth_data`` generators double as an OLAP-flavoured
bipartite workload: lineitem's (l_orderkey, l_partkey) pairs form an
order-part bipartite graph. These tests drive the exact-counting Spark
pipeline over it and diff against DuckDB row-by-row via the oracle.
"""
import pytest
from pyspark.sql import functions as F

from repro import synth_data
from repro.core import exact
from repro.core.encoding import enc_right
from repro.oracle import assert_equivalent


@pytest.fixture(scope="module")
def tpch_edges(spark):
    li = synth_data.lineitem(spark, sf=0.002, seed=0)
    df = (
        li.select(F.col("l_orderkey").alias("l"), F.col("l_partkey").alias("r"))
        .dropDuplicates()
    )
    return df, df.toPandas()


def test_tpch_bipartite_nonempty(tpch_edges):
    df, pdf = tpch_edges
    assert len(pdf) > 1000


def test_spark_count_matches_duckdb_on_tpch(tpch_edges):
    df, pdf = tpch_edges
    assert exact.butterflies_spark(df) == exact.butterflies_duckdb(pdf)


@pytest.mark.parametrize("center,side", [("l", "r"), ("r", "l")])
def test_spark_pipeline_oracle_on_tpch(tpch_edges, center, side):
    df, pdf = tpch_edges
    assert_equivalent(
        exact.butterflies_spark_df(df, center=center),
        exact.butterfly_sql(center, side),
        edges=pdf,
    )


def test_reference_engine_matches_on_tpch_subset(tpch_edges):
    _, pdf = tpch_edges
    sub = pdf.head(800)
    encoded = [(int(l), enc_right(int(r))) for l, r in zip(sub["l"], sub["r"])]
    assert exact.butterflies_reference(encoded) == exact.butterflies_duckdb(sub)


def test_wedge_aggregation_oracle(tpch_edges):
    """Check the *intermediate* wedge-pair aggregation row-by-row, not
    just the final scalar — a broken join would surface here."""
    df, pdf = tpch_edges
    a = df.select(F.col("r").alias("c"), F.col("l").alias("s1"))
    b = df.select(F.col("r").alias("c"), F.col("l").alias("s2"))
    pairs = (
        a.join(b, "c")
        .where(F.col("s1") < F.col("s2"))
        .groupBy("s1", "s2")
        .agg(F.count(F.lit(1)).alias("c"))
    )
    assert_equivalent(
        pairs,
        """
        SELECT a.l AS s1, b.l AS s2, COUNT(*) AS c
        FROM edges a JOIN edges b ON a.r = b.r AND a.l < b.l
        GROUP BY a.l, b.l
        """,
        edges=pdf,
    )
