"""Aggregation methods NoAgg / StructAgg / TransAgg / BothAgg (§7.1).

``BothAgg`` (the paper's default) first partitions transformations by
structure (a pure Spark groupBy — §3) and then runs the pivot-path
search *inside each structure group* via ``applyInPandas``, which is
exactly the parallelism the problem offers: structure groups are
independent. ``TransAgg`` runs one global pivot search (single group —
the paper observes this builds much longer inverted lists and is up to
an order of magnitude slower, which our benchmark reproduces).
"""
from __future__ import annotations

from dataclasses import dataclass

import pandas as pd
from pyspark.sql import DataFrame, SparkSession
from pyspark.sql import functions as F

from .pivot import group_by_pivot
from .terms import transformation_structure_key

AGG_METHODS = ("NoAgg", "StructAgg", "TransAgg", "BothAgg")

GROUPED_SCHEMA = "lhs string, rhs string, group_key string"


@dataclass(frozen=True)
class AggConfig:
    """Knobs of the program-grouping search (defaults follow §7 Setup)."""

    theta: int = 4
    affix: bool = True
    use_local: bool = True
    use_global: bool = True
    max_graph_len: int = 48
    use_const_terms: bool = True
    # Appendix-B sampling fallback: count containment against at most
    # this many graphs when a group is larger (None = exact counting).
    sample: int | None = 400


def _pivot_worker(cfg: AggConfig, prefix_struct: bool):
    def worker(pdf: pd.DataFrame) -> pd.DataFrame:
        trans = list(zip(pdf["lhs"], pdf["rhs"]))
        keys = group_by_pivot(
            trans,
            theta=cfg.theta,
            affix=cfg.affix,
            use_local=cfg.use_local,
            use_global=cfg.use_global,
            max_graph_len=cfg.max_graph_len,
            use_const_terms=cfg.use_const_terms,
            sample=cfg.sample,
        )
        if prefix_struct:
            keys = [
                transformation_structure_key(l, r) + "||" + k
                for (l, r), k in zip(trans, keys)
            ]
        return pd.DataFrame(
            {"lhs": pdf["lhs"], "rhs": pdf["rhs"], "group_key": keys}
        )

    return worker


def aggregate_transformations(
    spark: SparkSession,
    transformations: pd.DataFrame,
    method: str = "BothAgg",
    cfg: AggConfig = AggConfig(),
) -> pd.DataFrame:
    """Assign a ``group_key`` to each distinct transformation.

    ``transformations`` is a pandas frame with ``lhs``/``rhs`` columns
    (one row per distinct transformation). Returns the same frame plus
    ``group_key``: equal key ⇔ same aggregated group under ``method``.
    """
    if method not in AGG_METHODS:
        raise ValueError(f"unknown aggregation method {method!r}")
    trans = transformations[["lhs", "rhs"]].drop_duplicates().reset_index(
        drop=True
    )
    if method == "NoAgg":
        trans["group_key"] = trans["lhs"] + "\x1e" + trans["rhs"]
        return trans
    if method == "StructAgg":
        trans["group_key"] = [
            transformation_structure_key(l, r)
            for l, r in zip(trans["lhs"], trans["rhs"])
        ]
        return trans

    sdf = spark.createDataFrame(trans)
    if method == "BothAgg":
        struct_key = F.udf(transformation_structure_key)
        grouped = (
            sdf.withColumn("skey", struct_key("lhs", "rhs"))
            .groupBy("skey")
            .applyInPandas(
                _pivot_worker(cfg, prefix_struct=True), schema=GROUPED_SCHEMA
            )
        )
    else:  # TransAgg: one global pivot search.
        grouped = (
            sdf.withColumn("one", F.lit(1))
            .groupBy("one")
            .applyInPandas(
                _pivot_worker(cfg, prefix_struct=False), schema=GROUPED_SCHEMA
            )
        )
    return grouped.toPandas()
