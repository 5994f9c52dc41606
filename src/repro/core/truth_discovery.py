"""Truth discovery: majority consensus (paper §7.5).

MC picks, per cluster, the most frequent attribute value over the
cluster's records. When two values tie for the maximum frequency, MC
cannot produce a golden value (the paper counts this as a failure);
the golden value is NULL then. Implemented as pure DataFrame
aggregation so Catalyst plans the shuffle; oracle-checked against the
equivalent DuckDB SQL in tests.
"""
from __future__ import annotations

from pyspark.sql import DataFrame
from pyspark.sql import functions as F


def majority_consensus(
    records: DataFrame,
    *,
    cluster_col: str = "cluster_id",
    value_col: str = "value",
) -> DataFrame:
    """Golden value per cluster: ``(cluster_id, golden)``, NULL on ties."""
    counts = records.groupBy(cluster_col, value_col).agg(
        F.count(F.lit(1)).alias("n")
    )
    per_cluster = counts.groupBy(cluster_col).agg(
        F.max("n").alias("max_n"),
        F.max_by(value_col, F.struct(F.col("n"), F.col(value_col))).alias(
            "top_value"
        ),
    )
    n_top = (
        counts.alias("c")
        .join(per_cluster.alias("m"), on=cluster_col)
        .where(F.col("c.n") == F.col("m.max_n"))
        .groupBy(cluster_col)
        .agg(F.count(F.lit(1)).alias("n_at_max"))
    )
    return (
        per_cluster.join(n_top, on=cluster_col)
        .select(
            F.col(cluster_col),
            F.when(F.col("n_at_max") == 1, F.col("top_value"))
            .otherwise(F.lit(None))
            .alias("golden"),
        )
    )
