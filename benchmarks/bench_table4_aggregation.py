"""Benchmark for paper Table 4: aggregation time per method.

The paper's shape claims checked here: NoAgg/StructAgg take ~no time;
TransAgg is up to an order of magnitude slower than BothAgg (its global
inverted lists make the path intersections much longer); Affix is not
slower than NoAffix despite the extra labels (early termination).
Runs at a small sf so `pytest benchmarks/ --benchmark-only` stays quick;
`jobs/table4_aggregation_time.py` regenerates the full table.
"""
from dataclasses import replace

import pytest

from repro.core.pipeline import PipelineConfig, aggregate_rules, prepare_rules
from repro.entity_data import generate_dataset, to_spark

SF = 0.02
DATASET = "journaltitle"


@pytest.fixture(scope="module")
def rules(spark):
    rec, _ = generate_dataset(DATASET, sf=SF, seed=1)
    _, r = prepare_rules(spark, to_spark(spark, rec), PipelineConfig())
    return r


@pytest.mark.parametrize(
    "method", ["NoAgg", "StructAgg", "BothAgg", "TransAgg"]
)
def test_aggregation_time(benchmark, spark, rules, method):
    cfg = replace(PipelineConfig(), agg_method=method)
    benchmark.pedantic(
        lambda: aggregate_rules(spark, rules, cfg),
        rounds=1,
        iterations=1,
    )


@pytest.mark.parametrize("affix", [True, False], ids=["Affix", "NoAffix"])
def test_affix_aggregation_time(benchmark, spark, rules, affix):
    cfg = replace(PipelineConfig(), agg_method="BothAgg", affix=affix)
    benchmark.pedantic(
        lambda: aggregate_rules(spark, rules, cfg),
        rounds=1,
        iterations=1,
    )
