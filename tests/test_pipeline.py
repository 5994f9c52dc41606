"""Integration tests: GoldenRecordCreation end to end (Algorithm 1)."""
import pandas as pd
import pytest

from repro.core.pipeline import (
    PipelineConfig,
    build_applications,
    evaluate_mc,
    evaluate_merging,
    run_pipeline,
)
from repro.entity_data import (
    generate_dataset,
    mc_truth_sample,
    sample_labeled_pairs,
)


@pytest.fixture(scope="module")
def journal(spark):
    rec, truth = generate_dataset("journaltitle", sf=0.01, seed=7)
    cfg = PipelineConfig(budget_groups=40)
    res = run_pipeline(spark, rec, cfg)
    return rec, truth, res


def test_pipeline_produces_rules_and_groups(journal):
    _, _, res = journal
    assert res.n_rules > 50
    assert 0 < res.n_groups <= res.n_rules


def test_rules_have_all_annotations(journal):
    _, _, res = journal
    need = {"a", "b", "lhs", "rhs", "freq", "group_key", "rank", "is_true"}
    assert need <= set(res.rules.columns)
    assert res.rules["group_key"].notna().all()


def test_decisions_within_budget(journal):
    _, _, res = journal
    assert len(res.decisions) <= 40
    assert res.decisions["rank"].is_monotonic_increasing


def test_value_map_covers_all_cluster_values(journal):
    rec, _, res = journal
    mapped = set(zip(res.value_map["cluster_id"], res.value_map["value"]))
    for c, v in zip(rec["cluster_id"], rec["value"]):
        assert (c, v) in mapped


def test_merging_metrics_shape(journal):
    rec, _, res = journal
    pairs = sample_labeled_pairs(rec, 400, seed=1)
    m = evaluate_merging(res, pairs)
    # §7.1 headline shape: high precision, substantial recall.
    assert m["precision"] >= 0.9
    assert m["recall"] >= 0.3
    assert -1 <= m["mcc"] <= 1


def test_mc_improves_or_holds(spark, journal):
    rec, truth, res = journal
    ts = mc_truth_sample(rec, truth, 60, seed=2)
    before = evaluate_mc(spark, rec, ts, None)
    after = evaluate_mc(spark, rec, ts, res)
    assert after >= before  # Table 5 shape


def test_timings_recorded(journal):
    _, _, res = journal
    assert {"rule_mining", "aggregation", "application"} <= set(res.timings)
    assert all(v >= 0 for v in res.timings.values())


def test_zero_budget_pipeline_is_identity(spark):
    rec, _ = generate_dataset("journaltitle", sf=0.01, seed=3)
    res = run_pipeline(spark, rec, PipelineConfig(budget_groups=0))
    assert (res.value_map["value"] == res.value_map["new_value"]).all()


def test_noagg_low_recall_high_precision(spark):
    # §7.1: NoAgg confirms rules one by one → precision ~1, low recall.
    rec, _ = generate_dataset("journaltitle", sf=0.01, seed=7)
    res_no = run_pipeline(
        spark, rec, PipelineConfig(agg_method="NoAgg", budget_groups=40)
    )
    res_both = run_pipeline(spark, rec, PipelineConfig(budget_groups=40))
    pairs = sample_labeled_pairs(rec, 400, seed=1)
    m_no = evaluate_merging(res_no, pairs)
    m_both = evaluate_merging(res_both, pairs)
    assert m_no["precision"] >= 0.95
    assert m_both["recall"] > m_no["recall"]  # Figures 3–5 shape


def test_build_applications_direction():
    rules = pd.DataFrame(
        {
            "a": ["9"], "b": ["9th"], "lhs": ["9th"], "rhs": ["9"],
            "group_key": ["g"], "rank": [0],
        }
    )
    decisions = pd.DataFrame(
        {"group_key": ["g"], "approved": [True], "src_is_lhs": [False]}
    )
    occ = pd.DataFrame(
        {
            "a": ["9", "9"], "b": ["9th", "9th"], "side": ["a", "b"],
            "cluster_id": [1, 1], "value": ["9 St", "9th St"],
            "p": [0, 0], "q": [1, 3], "other": ["9th St", "9 St"],
        }
    )
    apps = build_applications(rules, decisions, occ)
    # src_is_lhs=False → src = rhs = "9", tgt = "9th".
    assert list(apps["src"]) == ["9"]
    assert list(apps["tgt"]) == ["9th"]
    assert list(apps["cluster_id"]) == [1]


def test_build_applications_empty_decisions():
    rules = pd.DataFrame(
        {"a": ["x"], "b": ["y"], "lhs": ["x"], "rhs": ["y"],
         "group_key": ["g"], "rank": [0]}
    )
    decisions = pd.DataFrame(
        {"group_key": ["g"], "approved": [False], "src_is_lhs": [True]}
    )
    apps = build_applications(rules, decisions, pd.DataFrame())
    assert apps.empty
