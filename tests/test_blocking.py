"""Spark tests for blocking and candidate-pair generation (§2.3)."""
import pandas as pd
import pytest
from pyspark.sql import functions as F

from repro.core.blocking import block_keys, candidate_pairs


@pytest.fixture(scope="module")
def records(tuned_spark):
    pdf = pd.DataFrame(
        {
            "subject": ["a1", "a2", "a3", "b1", "b2", "c1"],
            "etype": ["person", "person", "person", "movie", "movie", "person"],
            "aliases": [
                ["Robert Ashton"], ["Bob Ashton", "Robert Ashton"],
                ["Susan Vance"], ["Robert Ashton"],  # movie with a person's name
                ["Winter Story"], ["Xq"],             # short-token-only name
            ],
            "attrs": [{}, {}, {}, {}, {}, {}],
        }
    )
    return tuned_spark.createDataFrame(pdf).localCheckpoint(eager=True)


class TestBlockKeys:
    def test_keys_are_type_namespaced(self, records):
        keys = block_keys(records).collect()
        for r in keys:
            assert r.block_key.startswith(f"{r.etype}|")

    def test_token_and_prefix_keys_emitted(self, records):
        keys = {r.block_key for r in block_keys(records).collect()}
        assert "person|tok|robert" in keys
        assert "person|pfx|robe" in keys

    def test_short_tokens_skipped(self, records):
        keys = {r.block_key for r in block_keys(records).collect()}
        assert not any("|tok|xq" in k for k in keys)
        assert "person|pfx|xq" in keys  # prefix key still exists

    def test_all_aliases_indexed(self, records):
        keys = block_keys(records)
        a2 = keys.filter(F.col("subject") == "a2").collect()
        toks = {r.block_key for r in a2}
        assert "person|tok|bob" in toks and "person|tok|robert" in toks


class TestCandidatePairs:
    def test_same_name_same_type_paired(self, records):
        pairs = {(r.a, r.b) for r in candidate_pairs(records).collect()}
        assert ("a1", "a2") in pairs

    def test_cross_type_names_not_paired(self, records):
        pairs = {(r.a, r.b) for r in candidate_pairs(records).collect()}
        assert ("a1", "b1") not in pairs and ("b1", "a1") not in pairs

    def test_pairs_are_ordered_and_unique(self, records):
        rows = candidate_pairs(records).collect()
        assert all(r.a < r.b for r in rows)
        assert len(rows) == len({(r.a, r.b) for r in rows})

    def test_unrelated_not_paired(self, records):
        pairs = {(r.a, r.b) for r in candidate_pairs(records).collect()}
        assert ("a3", "b2") not in pairs

    def test_max_block_size_drops_stopword_blocks(self, tuned_spark):
        pdf = pd.DataFrame(
            {
                "subject": [f"s{i}" for i in range(30)],
                "etype": ["movie"] * 30,
                "aliases": [[f"The Film {i}"] for i in range(30)],
                "attrs": [{}] * 30,
            }
        )
        recs = tuned_spark.createDataFrame(pdf)
        # 'the'/'film' blocks have 30 members: dropped at max_block_size=10
        assert candidate_pairs(recs, max_block_size=10).count() == 0
        assert candidate_pairs(recs, max_block_size=60).count() > 0

    def test_quadratic_reduction(self, tuned_spark, uni):
        """Blocking must prune the O(n²) pair space by orders of magnitude."""
        from repro.core.matching import match_records
        from repro.experiments.common import kg_from_universe

        kg = kg_from_universe(tuned_spark, uni)
        recs = match_records(kg).localCheckpoint(eager=True)
        n = recs.count()
        n_pairs = candidate_pairs(recs).count()
        assert n_pairs < 0.05 * n * (n - 1) / 2
