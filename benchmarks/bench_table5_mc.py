"""Benchmark for paper Table 5: the full golden-record pipeline.

Times GoldenRecordCreation end to end (rule mining → grouping → expert
→ application) per dataset at a small sf, and asserts the Table 5 shape
(MC precision does not degrade) as a sanity side-check.
`jobs/table5_mc_precision.py` regenerates the precision table itself.
"""
import pytest

from repro.core.pipeline import PipelineConfig, evaluate_mc, run_pipeline
from repro.entity_data import generate_dataset, mc_truth_sample

SF = {"authorlist": 0.03, "address": 0.03, "journaltitle": 0.02}
THETA = {"authorlist": 5, "journaltitle": 4, "address": 4}


@pytest.mark.parametrize("dataset", ["authorlist", "address", "journaltitle"])
def test_pipeline_end_to_end(benchmark, spark, dataset):
    rec, truth = generate_dataset(dataset, sf=SF[dataset], seed=1)
    cfg = PipelineConfig(theta=THETA[dataset], budget_groups=60)
    result = benchmark.pedantic(
        lambda: run_pipeline(spark, rec, cfg), rounds=1, iterations=1
    )
    ts = mc_truth_sample(rec, truth, 60, seed=2)
    before = evaluate_mc(spark, rec, ts, None)
    after = evaluate_mc(spark, rec, ts, result)
    assert after >= before - 0.05  # Table 5 shape: never materially worse
