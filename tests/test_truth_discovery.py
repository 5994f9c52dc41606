"""Tests for repro.core.truth_discovery — majority consensus (§7.5)."""
import pytest
from pyspark.sql import functions as F

from repro.core.truth_discovery import majority_consensus
from repro.oracle import assert_equivalent


@pytest.fixture(scope="module")
def records(spark):
    rows = [
        (1, 1, "a"), (1, 2, "a"), (1, 3, "b"),          # clear majority
        (2, 4, "x"), (2, 5, "y"),                        # tie → NULL
        (3, 6, "only"),                                  # singleton
        (4, 7, "p"), (4, 8, "p"), (4, 9, "q"), (4, 10, "q"),  # tie → NULL
        (5, 11, "m"), (5, 12, "m"), (5, 13, "m"),
    ]
    return spark.createDataFrame(
        rows, "cluster_id long, record_id long, value string"
    )


def test_majority_wins(records):
    g = {r["cluster_id"]: r["golden"] for r in majority_consensus(records).collect()}
    assert g[1] == "a"
    assert g[5] == "m"


def test_tie_yields_null(records):
    g = {r["cluster_id"]: r["golden"] for r in majority_consensus(records).collect()}
    assert g[2] is None
    assert g[4] is None


def test_singleton_cluster(records):
    g = {r["cluster_id"]: r["golden"] for r in majority_consensus(records).collect()}
    assert g[3] == "only"


def test_one_row_per_cluster(records):
    out = majority_consensus(records)
    assert out.count() == out.select("cluster_id").distinct().count() == 5


def test_mc_oracle(spark, records):
    # Oracle check against DuckDB: most frequent value, NULL on ties.
    out = majority_consensus(records)
    sql = """
        WITH counts AS (
            SELECT cluster_id, value, count(*) AS n
            FROM rec GROUP BY cluster_id, value
        ), ranked AS (
            SELECT cluster_id, value, n,
                   max(n) OVER (PARTITION BY cluster_id) AS max_n,
                   count(*) FILTER (WHERE TRUE)
                     OVER (PARTITION BY cluster_id) AS dummy
            FROM counts
        )
        SELECT cluster_id,
               CASE WHEN count(*) FILTER (WHERE n = max_n) = 1
                    THEN max(CASE WHEN n = max_n THEN value END)
                    ELSE NULL END AS golden
        FROM ranked GROUP BY cluster_id
    """
    assert_equivalent(out, sql, rec=records)


def test_mc_on_tpch_lite(spark):
    # MC over a synthetic TPC-H-lite column: grouping machinery handles
    # larger shuffles; oracle-checked.
    from repro.synth_data import orders

    o = orders(spark, sf=0.002, seed=11)
    recs = o.select(
        F.col("o_custkey").alias("cluster_id"),
        F.col("o_orderkey").alias("record_id"),
        F.col("o_orderpriority").alias("value"),
    )
    out = majority_consensus(recs)
    sql = """
        WITH counts AS (
            SELECT cluster_id, value, count(*) AS n
            FROM rec GROUP BY cluster_id, value
        ), m AS (
            SELECT cluster_id, max(n) AS max_n FROM counts GROUP BY cluster_id
        )
        SELECT c.cluster_id,
               CASE WHEN count(*) FILTER (WHERE c.n = m.max_n) = 1
                    THEN max(CASE WHEN c.n = m.max_n THEN c.value END)
                    ELSE NULL END AS golden
        FROM counts c JOIN m ON c.cluster_id = m.cluster_id
        GROUP BY c.cluster_id
    """
    assert_equivalent(out, sql, rec=recs)


def test_custom_column_names(spark):
    recs = spark.createDataFrame(
        [(1, "v"), (1, "v"), (1, "w")], "cid long, val string"
    )
    out = majority_consensus(recs, cluster_col="cid", value_col="val")
    assert out.collect()[0]["golden"] == "v"
