"""End-to-end GoldenRecordCreation (paper Algorithm 1).

Wires together: rule mining (Spark, cluster-parallel) → rule
frequencies (Spark aggregation) → transformation selection (§5) →
aggregation into groups (§3/§4, structure-group-parallel in Spark) →
frequency ranking (§6) → simulated expert confirmation → rule
application (Spark, cluster-parallel) → majority-consensus truth
discovery (§7.5). Returns every intermediate product so jobs, tests and
benchmarks can measure exactly what each paper table measures.
"""
from __future__ import annotations

import time
from dataclasses import dataclass, field

import pandas as pd
from pyspark.sql import DataFrame, SparkSession

from .apply_rules import ApprovedGroup, apply_approved_rules, parse_group_key
from .expert import global_token_counts, label_rules, simulate_expert
from .grouping import AggConfig, aggregate_transformations
from .metrics import confusion, mc_precision
from .ranking import rank_groups
from .rules import mine_rules, rule_frequencies, rule_record_weights
from .selection import select_transformations
from .truth_discovery import majority_consensus

APPLICATION_SCHEMA = (
    "cluster_id long, src string, tgt string, rank long, value string, p int"
)


@dataclass(frozen=True)
class PipelineConfig:
    """Defaults follow §7 Setup (BothAgg, BestDir, both thresholds,
    affix on, θ=4; the paper uses θ=5 for AuthorList)."""

    agg_method: str = "BothAgg"
    selection: str = "BestDir"
    theta: int = 4
    affix: bool = True
    use_local: bool = True
    use_global: bool = True
    max_graph_len: int = 48
    budget_groups: int = 100
    approve_frac: float = 0.8
    include_full_pairs: bool = True
    max_pairs_per_cluster: int | None = 400
    reapply: bool = True
    seed: int = 0

    def agg_config(self) -> AggConfig:
        return AggConfig(
            theta=self.theta,
            affix=self.affix,
            use_local=self.use_local,
            use_global=self.use_global,
            max_graph_len=self.max_graph_len,
        )


@dataclass
class PipelineResult:
    rules: pd.DataFrame  # per distinct rule: a,b,freq_*,lhs,rhs,group_key,rank,is_true
    decisions: pd.DataFrame  # per inspected group
    value_map: pd.DataFrame  # cluster_id, value, new_value
    updated_records: DataFrame  # Spark: cluster_id, record_id, value, new_value
    timings: dict[str, float] = field(default_factory=dict)

    @property
    def n_rules(self) -> int:
        return len(self.rules)

    @property
    def n_groups(self) -> int:
        return self.rules["group_key"].nunique()


def prepare_rules(
    spark: SparkSession,
    records: DataFrame,
    cfg: PipelineConfig,
) -> tuple[pd.DataFrame, pd.DataFrame]:
    """Mine occurrences and distinct rules with frequencies (Steps 1).

    Returns ``(occurrences_pdf, rules_pdf)``; kept separate from
    :func:`run_pipeline` so benchmarks can time aggregation alone.
    """
    occ = mine_rules(
        records,
        include_full_pairs=cfg.include_full_pairs,
        max_pairs_per_cluster=cfg.max_pairs_per_cluster,
    ).cache()
    rules = rule_frequencies(occ).toPandas()
    weights = rule_record_weights(occ, records).toPandas()
    rules = rules.merge(weights, on=["a", "b"], how="left")
    rules[["w_a", "w_b"]] = rules[["w_a", "w_b"]].fillna(0)
    occ_pdf = occ.toPandas()
    occ.unpersist()
    return occ_pdf, rules


def aggregate_rules(
    spark: SparkSession, rules: pd.DataFrame, cfg: PipelineConfig
) -> tuple[pd.DataFrame, float]:
    """Steps 2–4: selection + aggregation. Returns rules with
    ``lhs/rhs/group_key`` and the aggregation wall time (Table 4's
    measured quantity)."""
    selected = select_transformations(rules, cfg.selection, seed=cfg.seed)
    t0 = time.perf_counter()
    grouped = aggregate_transformations(
        spark, selected[["lhs", "rhs"]], cfg.agg_method, cfg.agg_config()
    )
    agg_time = time.perf_counter() - t0
    return selected.merge(grouped, on=["lhs", "rhs"], how="left"), agg_time


def build_applications(
    rules_ranked: pd.DataFrame,
    decisions: pd.DataFrame,
    occurrences: pd.DataFrame,
) -> pd.DataFrame:
    """Replacement-set rows for every rule of every approved group (§6)."""
    approved = decisions[decisions["approved"]][["group_key", "src_is_lhs"]]
    rules = rules_ranked.merge(approved, on="group_key")
    if rules.empty:
        return pd.DataFrame(
            columns=["cluster_id", "src", "tgt", "rank", "value", "p"]
        )
    rules = rules.assign(
        src=rules["lhs"].where(rules["src_is_lhs"], rules["rhs"]),
        tgt=rules["rhs"].where(rules["src_is_lhs"], rules["lhs"]),
    )
    rules = rules.assign(
        src_side=[
            "a" if s == a else "b"
            for s, a in zip(rules["src"], rules["a"])
        ]
    )
    apps = occurrences.merge(
        rules[["a", "b", "src", "tgt", "rank", "src_side"]],
        on=["a", "b"],
    )
    apps = apps[apps["side"] == apps["src_side"]]
    apps = apps[["cluster_id", "src", "tgt", "rank", "value", "p"]]
    # Non-insertion rules need one row per (cluster, rule); insertions
    # keep their per-value positions.
    non_ins = apps[apps["src"] != ""].drop_duplicates(
        ["cluster_id", "src", "tgt", "rank"]
    )
    ins = apps[apps["src"] == ""].drop_duplicates()
    return pd.concat([non_ins, ins], ignore_index=True)


def run_pipeline(
    spark: SparkSession,
    records_pdf: pd.DataFrame,
    cfg: PipelineConfig = PipelineConfig(),
) -> PipelineResult:
    """Algorithm 1 end to end over one attribute column."""
    from ..entity_data import sub_entity_map, to_spark

    timings: dict[str, float] = {}
    records = to_spark(spark, records_pdf)

    t0 = time.perf_counter()
    occ_pdf, rules = prepare_rules(spark, records, cfg)
    timings["rule_mining"] = time.perf_counter() - t0

    rules_grouped, timings["aggregation"] = aggregate_rules(spark, rules, cfg)
    ranked = rank_groups(rules_grouped)

    labels = label_rules(occ_pdf, sub_entity_map(records_pdf))
    ranked = ranked.merge(labels, on=["a", "b"], how="left")
    ranked["is_true"] = ranked["is_true"].fillna(False)

    t0 = time.perf_counter()
    decisions = simulate_expert(
        ranked,
        cfg.budget_groups,
        approve_frac=cfg.approve_frac,
        token_freq=global_token_counts(records_pdf),
    )
    apps_pdf = build_applications(ranked, decisions, occ_pdf)
    groups: list[ApprovedGroup] = []
    if cfg.reapply:
        approved = decisions[decisions["approved"]]
        groups = [
            parse_group_key(k, bool(s))
            for k, s in zip(approved["group_key"], approved["src_is_lhs"])
        ]
        groups = [g for g in groups if g.path is not None]
    if apps_pdf.empty:
        updated = records.withColumn("new_value", records["value"])
    else:
        apps = spark.createDataFrame(apps_pdf, schema=APPLICATION_SCHEMA)
        updated = apply_approved_rules(
            records, apps, approved_groups=groups
        )
    updated = updated.cache()
    value_map = (
        updated.select("cluster_id", "value", "new_value")
        .dropDuplicates(["cluster_id", "value"])
        .toPandas()
    )
    timings["application"] = time.perf_counter() - t0

    return PipelineResult(
        rules=ranked,
        decisions=decisions,
        value_map=value_map,
        updated_records=updated,
        timings=timings,
    )


def evaluate_merging(
    result: PipelineResult, sample_pairs: pd.DataFrame
) -> dict[str, float]:
    """§7.1 protocol: precision/recall/MCC over the labeled sample."""
    return confusion(sample_pairs, result.value_map)


def evaluate_mc(
    spark: SparkSession,
    records_pdf: pd.DataFrame,
    truth_pdf: pd.DataFrame,
    result: PipelineResult | None,
) -> float:
    """§7.5 protocol: MC precision before (result=None) or after."""
    from ..entity_data import to_spark

    if result is None:
        recs = to_spark(spark, records_pdf)
        golden = majority_consensus(recs).toPandas()
    else:
        golden = majority_consensus(
            result.updated_records.select(
                "cluster_id", "record_id", "new_value"
            ).withColumnRenamed("new_value", "value")
        ).toPandas()
    return mc_precision(golden, truth_pdf)
