"""Tests for repro.core.rules — Spark rule mining (§2 Step 1, §6)."""
import pandas as pd
import pytest
from pyspark.sql import functions as F

from repro.core.rules import (
    mine_rules,
    rule_frequencies,
    rule_record_weights,
)
from repro.oracle import assert_equivalent

TABLE1_ADDRESSES = [
    (1, 1, "9 St, 02141 Wisconsin"),
    (1, 2, "9th St, 02141 WI"),
    (1, 3, "9 Street, 02141 WI"),
    (2, 4, "3 E Avenue, 33990 CA"),
    (2, 5, "3rd E Ave, 33990 California"),
    (2, 6, "5th Str, 22701 New York"),
]


@pytest.fixture(scope="module")
def table1(spark):
    return spark.createDataFrame(
        TABLE1_ADDRESSES, "cluster_id long, record_id long, value string"
    )


@pytest.fixture(scope="module")
def occurrences(table1):
    return mine_rules(table1).cache()


def test_paper_example_rules_present(occurrences):
    rules = {
        (r["a"], r["b"]) for r in occurrences.select("a", "b").collect()
    }
    # Example 2.1 rules from r1 vs r2 (canonically ordered).
    assert ("9", "9th") in rules
    assert ("WI", "Wisconsin") in rules
    # r4 vs r5 rules.
    assert ("3", "3rd") in rules
    assert ("CA", "California") in rules
    assert ("Ave,", "Avenue,") in rules


def test_full_value_rules_present(occurrences):
    rules = {
        (r["a"], r["b"]) for r in occurrences.select("a", "b").collect()
    }
    a, b = sorted(["9 St, 02141 Wisconsin", "9th St, 02141 WI"])
    assert (a, b) in rules


def test_no_full_value_rules_when_disabled(table1):
    occ = mine_rules(table1, include_full_pairs=False)
    rules = {(r["a"], r["b"]) for r in occ.select("a", "b").collect()}
    # The Example 2.2 full-pair rule of r1 vs r2 must be absent (they
    # share tokens, so only aligned-gap rules remain). Token-free pairs
    # like r4 vs r6 still legitimately yield a whole-value gap.
    a, b = sorted(["9 St, 02141 Wisconsin", "9th St, 02141 WI"])
    assert (a, b) not in rules


def test_occurrence_spans_point_into_value(occurrences):
    for r in occurrences.collect():
        side_str = r["a"] if r["side"] == "a" else r["b"]
        assert r["value"][r["p"] : r["q"]] == side_str


def test_occurrences_carry_provenance(occurrences):
    for r in occurrences.collect():
        assert r["other"] != r["value"]


def test_rules_are_cluster_local(occurrences):
    # "5th Str..." shares no tokens with r4/r5 → the full-pair rule for
    # r4 vs r6 exists but no cross-cluster rule ever mixes clusters.
    assert occurrences.where(
        (F.col("cluster_id") != 1) & (F.col("cluster_id") != 2)
    ).count() == 0


def test_example_6_1_replacement_sets(occurrences):
    # L[Wisconsin→WI] has 1 entry; L[WI→Wisconsin] has 2 (r2 and r3).
    wi = (
        occurrences.where(
            (F.col("a") == "WI") & (F.col("b") == "Wisconsin")
        )
        .select("side", "value", "p", "q")
        .dropDuplicates()  # replacement sets are sets of ⟨v,p,q⟩ triples
        .toPandas()
    )
    assert (wi["side"] == "b").sum() == 1  # Wisconsin occurrences
    assert (wi["side"] == "a").sum() == 2  # WI occurrences


def test_rule_frequencies_match_example_6_1(occurrences):
    freq = rule_frequencies(occurrences).toPandas().set_index(["a", "b"])
    row = freq.loc[("WI", "Wisconsin")]
    assert row["freq_a"] == 2 and row["freq_b"] == 1 and row["freq"] == 2


def test_rule_frequencies_oracle(spark, occurrences):
    # Oracle check: the Spark aggregation equals the same SQL in DuckDB.
    freq = rule_frequencies(occurrences).select(
        "a", "b", "freq_a", "freq_b", "freq"
    )
    sql = """
        SELECT a, b,
               count(*) FILTER (WHERE side = 'a') AS freq_a,
               count(*) FILTER (WHERE side = 'b') AS freq_b,
               greatest(count(*) FILTER (WHERE side = 'a'),
                        count(*) FILTER (WHERE side = 'b')) AS freq
        FROM (SELECT DISTINCT a, b, side, cluster_id, value, p, q FROM occ)
        GROUP BY a, b
    """
    assert_equivalent(freq, sql, occ=occurrences)


def test_rule_record_weights(spark, table1, occurrences):
    w = rule_record_weights(occurrences, table1).toPandas()
    row = w.set_index(["a", "b"]).loc[("WI", "Wisconsin")]
    # Each address value appears on exactly one record here.
    assert row["w_a"] == 2 and row["w_b"] == 1


def test_record_weights_respect_multiplicity(spark):
    recs = spark.createDataFrame(
        [(1, 1, "x y"), (1, 2, "x y"), (1, 3, "x z")],
        "cluster_id long, record_id long, value string",
    )
    occ = mine_rules(recs, include_full_pairs=False)
    w = rule_record_weights(occ, recs).toPandas().set_index(["a", "b"])
    # Rule y↔z: "x y" carried by 2 records, "x z" by 1.
    assert w.loc[("y", "z")]["w_a"] == 2
    assert w.loc[("y", "z")]["w_b"] == 1


def test_max_pairs_cap(spark):
    values = [(1, i, f"v{i} common") for i in range(12)]
    recs = spark.createDataFrame(
        values, "cluster_id long, record_id long, value string"
    )
    occ_all = mine_rules(recs, include_full_pairs=True)
    occ_cap = mine_rules(recs, include_full_pairs=True, max_pairs_per_cluster=5)
    assert occ_cap.count() < occ_all.count()


def test_single_value_cluster_yields_nothing(spark):
    recs = spark.createDataFrame(
        [(9, 1, "only one")], "cluster_id long, record_id long, value string"
    )
    assert mine_rules(recs).count() == 0


def test_duplicate_values_dropped(spark):
    recs = spark.createDataFrame(
        [(1, 1, "a b"), (1, 2, "a b"), (1, 3, "a c")],
        "cluster_id long, record_id long, value string",
    )
    occ = mine_rules(recs, include_full_pairs=False).toPandas()
    # Only one distinct pair → exactly 2 occurrence rows (b↔c).
    assert len(occ) == 2
    assert set(zip(occ["a"], occ["b"])) == {("b", "c")}
