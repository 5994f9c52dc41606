"""Benchmark for paper Table 7: aggregation time per selection method.

RandDir / LongDir / RevDir / BestDir feed the same BothAgg grouping;
the paper reports similar aggregation times across the four (Table 7),
which this bench verifies at small scale.
"""
from dataclasses import replace

import pytest

from repro.core.pipeline import PipelineConfig, aggregate_rules, prepare_rules
from repro.entity_data import generate_dataset, to_spark


@pytest.fixture(scope="module")
def rules(spark):
    rec, _ = generate_dataset("journaltitle", sf=0.02, seed=1)
    _, r = prepare_rules(spark, to_spark(spark, rec), PipelineConfig())
    return r


@pytest.mark.parametrize(
    "method", ["RandDir", "LongDir", "RevDir", "BestDir"]
)
def test_selection_aggregation_time(benchmark, spark, rules, method):
    cfg = replace(PipelineConfig(), selection=method)
    benchmark.pedantic(
        lambda: aggregate_rules(spark, rules, cfg), rounds=1, iterations=1
    )
