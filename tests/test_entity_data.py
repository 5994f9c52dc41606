"""Tests for repro.entity_data — the synthetic paper datasets (§7)."""
import pandas as pd
import pytest

from repro.entity_data import (
    DATASETS,
    dataset_stats,
    generate_dataset,
    mc_truth_sample,
    sample_labeled_pairs,
    sub_entity_map,
    to_spark,
)


@pytest.mark.parametrize("dataset", DATASETS)
def test_deterministic_in_seed(dataset):
    r1, t1 = generate_dataset(dataset, sf=0.02, seed=5)
    r2, t2 = generate_dataset(dataset, sf=0.02, seed=5)
    pd.testing.assert_frame_equal(r1, r2)
    pd.testing.assert_frame_equal(t1, t2)


@pytest.mark.parametrize("dataset", DATASETS)
def test_different_seeds_differ(dataset):
    r1, _ = generate_dataset(dataset, sf=0.02, seed=1)
    r2, _ = generate_dataset(dataset, sf=0.02, seed=2)
    assert not r1["value"].equals(r2["value"])


def test_unknown_dataset_raises():
    with pytest.raises(ValueError):
        generate_dataset("nope")


@pytest.mark.parametrize("dataset", DATASETS)
def test_schema(dataset):
    rec, truth = generate_dataset(dataset, sf=0.02, seed=0)
    assert list(rec.columns) == ["cluster_id", "record_id", "value", "sub_id"]
    assert list(truth.columns) == ["cluster_id", "canonical"]
    assert rec["record_id"].is_unique
    assert truth["cluster_id"].is_unique
    assert set(rec["cluster_id"]) == set(truth["cluster_id"])


def test_sf_scales_cluster_counts():
    small, _ = generate_dataset("address", sf=0.05, seed=0)
    big, _ = generate_dataset("address", sf=0.2, seed=0)
    assert big["cluster_id"].nunique() > small["cluster_id"].nunique()


def test_table6_shapes():
    # Cluster-size shapes follow paper Table 6: AuthorList biggest
    # clusters (avg 26.85), Address mid (5.76), JournalTitle tiny (1.79).
    stats = {
        ds: dataset_stats(generate_dataset(ds, sf=0.05, seed=3)[0])
        for ds in DATASETS
    }
    assert 15 < stats["authorlist"]["avg_size"] < 40
    assert 3 < stats["address"]["avg_size"] < 9
    assert 1.3 < stats["journaltitle"]["avg_size"] < 2.3
    assert (
        stats["authorlist"]["avg_size"]
        > stats["address"]["avg_size"]
        > stats["journaltitle"]["avg_size"]
    )


def test_duplicate_pair_rates_follow_paper():
    # §7.1: only 18% / 26.5% / 74% of within-cluster value pairs are real
    # duplicates on Address / AuthorList / JournalTitle.
    rates = {}
    for ds in DATASETS:
        rec, _ = generate_dataset(ds, sf=0.1, seed=1)
        pairs = sample_labeled_pairs(rec, 50000, seed=2)
        rates[ds] = pairs["is_dup"].mean()
    assert 0.10 < rates["address"] < 0.35
    assert 0.15 < rates["authorlist"] < 0.40
    assert 0.55 < rates["journaltitle"] < 0.90
    assert rates["address"] < rates["journaltitle"]
    assert rates["authorlist"] < rates["journaltitle"]


def test_authorlist_is_lowercase():
    rec, truth = generate_dataset("authorlist", sf=0.02, seed=0)
    assert (rec["value"] == rec["value"].str.lower()).all()
    assert (truth["canonical"] == truth["canonical"].str.lower()).all()


def test_sub_entity_map_covers_all_values():
    rec, _ = generate_dataset("journaltitle", sf=0.02, seed=0)
    m = sub_entity_map(rec)
    for c, v in zip(rec["cluster_id"], rec["value"]):
        assert (c, v) in m


def test_sample_labeled_pairs_within_cluster():
    rec, _ = generate_dataset("address", sf=0.05, seed=0)
    pairs = sample_labeled_pairs(rec, 200, seed=1)
    values_by_cluster = rec.groupby("cluster_id")["value"].agg(set)
    for c, v1, v2 in zip(pairs["cluster_id"], pairs["v1"], pairs["v2"]):
        assert v1 in values_by_cluster[c]
        assert v2 in values_by_cluster[c]
        assert v1 < v2  # canonical order, no self-pairs


def test_sample_labeled_pairs_labels_match_sub_map():
    rec, _ = generate_dataset("authorlist", sf=0.02, seed=0)
    m = sub_entity_map(rec)
    pairs = sample_labeled_pairs(rec, 100, seed=1)
    for c, v1, v2, dup in zip(
        pairs["cluster_id"], pairs["v1"], pairs["v2"], pairs["is_dup"]
    ):
        assert dup == (m[(c, v1)] == m[(c, v2)])


def test_sample_size_cap():
    rec, _ = generate_dataset("journaltitle", sf=0.05, seed=0)
    pairs = sample_labeled_pairs(rec, 50, seed=1)
    assert len(pairs) == 50


def test_mc_truth_sample_multi_record_only():
    rec, truth = generate_dataset("journaltitle", sf=0.05, seed=0)
    ts = mc_truth_sample(rec, truth, 50, seed=1)
    sizes = rec.groupby("cluster_id").size()
    assert (sizes[ts["cluster_id"]] >= 2).all()
    assert len(ts) == 50


def test_truth_canonical_is_dominant_sub():
    rec, truth = generate_dataset("address", sf=0.05, seed=0)
    # The dominant sub (index 0) always has a record, and the canonical
    # value appears among its records for a decent share of clusters.
    joined = rec.merge(truth, on="cluster_id")
    has_canon = joined.groupby("cluster_id").apply(
        lambda g: (g["value"] == g["canonical"]).any(), include_groups=False
    )
    assert has_canon.mean() > 0.5


def test_to_spark_drops_hidden_truth(spark):
    rec, _ = generate_dataset("journaltitle", sf=0.02, seed=0)
    sdf = to_spark(spark, rec)
    assert set(sdf.columns) == {"cluster_id", "record_id", "value"}
    assert sdf.count() == len(rec)


def test_variation_exists_within_clusters():
    # The whole point: clusters contain multiple variant spellings.
    for ds in DATASETS:
        rec, _ = generate_dataset(ds, sf=0.05, seed=2)
        per_cluster = rec.groupby("cluster_id")["value"].nunique()
        assert (per_cluster > 1).any()
