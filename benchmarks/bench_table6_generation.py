"""Benchmark for Table 6 substrate: synthetic dataset generation + rule
mining throughput per dataset (the input side of every other table)."""
import pytest

from repro.core.pipeline import PipelineConfig, prepare_rules
from repro.entity_data import generate_dataset, to_spark


@pytest.mark.parametrize("dataset", ["authorlist", "address", "journaltitle"])
def test_generate_dataset(benchmark, dataset):
    rec, truth = benchmark.pedantic(
        lambda: generate_dataset(dataset, sf=0.05, seed=1),
        rounds=1,
        iterations=1,
    )
    assert len(rec) > 0 and len(truth) > 0


@pytest.mark.parametrize("dataset", ["address", "journaltitle"])
def test_rule_mining(benchmark, spark, dataset):
    rec, _ = generate_dataset(dataset, sf=0.02, seed=1)
    records = to_spark(spark, rec)
    occ, rules = benchmark.pedantic(
        lambda: prepare_rules(spark, records, PipelineConfig()),
        rounds=1,
        iterations=1,
    )
    assert len(rules) > 0
