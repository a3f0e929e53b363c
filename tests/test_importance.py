"""Spark tests for entity importance (§3.3), degree features oracle-checked."""
import pytest
from pyspark.sql import functions as F

from repro.engine.importance import (
    degree_features,
    entity_edges,
    importance_view,
    pagerank,
)
from repro.oracle import assert_equivalent


@pytest.fixture(scope="module")
def imp(small_kg):
    return importance_view(small_kg, pr_iters=4).localCheckpoint(eager=True)


class TestDegrees:
    def test_degrees_match_oracle(self, small_kg):
        got = degree_features(small_kg).select("subject", "out_degree", "in_degree")
        edges = entity_edges(small_kg)
        sql = """
            WITH subj AS (SELECT DISTINCT subject FROM kg),
            outd AS (SELECT src AS subject, count(*) AS out_degree FROM edges GROUP BY 1),
            ind AS (SELECT dst AS subject, count(*) AS in_degree FROM edges GROUP BY 1)
            SELECT s.subject,
                   COALESCE(o.out_degree, 0) AS out_degree,
                   COALESCE(i.in_degree, 0) AS in_degree
            FROM subj s LEFT JOIN outd o USING (subject) LEFT JOIN ind i USING (subject)
        """
        assert_equivalent(got, sql, kg=small_kg.select("subject"), edges=edges)

    def test_identities_match_oracle(self, small_kg):
        got = degree_features(small_kg).select("subject", "n_identities")
        long = small_kg.select("subject", F.explode("sources").alias("source"))
        sql = """
            SELECT subject, CAST(count(DISTINCT source) AS BIGINT) AS n_identities
            FROM long GROUP BY subject
        """
        assert_equivalent(got, sql, long=long)

    def test_every_entity_has_a_row(self, small_kg):
        feats = degree_features(small_kg)
        assert feats.count() == small_kg.select("subject").distinct().count()


class TestPagerank:
    def test_mass_conserved_modulo_dangling(self, small_kg):
        pr = pagerank(small_kg, iters=4)
        total = pr.agg(F.sum("pagerank")).first()[0]
        # dangling nodes leak mass; total must stay in (0, 1]
        assert 0.1 < total <= 1.000001

    def test_referenced_entities_outrank_isolated(self, small_kg):
        pr = {r.subject: r.pagerank for r in pagerank(small_kg, iters=4).collect()}
        edges = entity_edges(small_kg)
        popular = (
            edges.groupBy("dst").count().orderBy(F.desc("count")).first().dst
        )
        isolated = (
            small_kg.select("subject")
            .distinct()
            .join(edges.select(F.col("dst").alias("subject")), "subject", "left_anti")
            .first()
            .subject
        )
        assert pr[popular] > pr[isolated]

    def test_deterministic(self, small_kg):
        a = {r.subject: r.pagerank for r in pagerank(small_kg, iters=3).collect()}
        b = {r.subject: r.pagerank for r in pagerank(small_kg, iters=3).collect()}
        assert a == pytest.approx(b)


class TestAggregateImportance:
    def test_in_unit_interval(self, imp):
        mn, mx = imp.agg(F.min("importance"), F.max("importance")).first()
        assert 0.0 <= mn and mx <= 1.0

    def test_all_four_signals_present(self, imp):
        assert {"out_degree", "in_degree", "n_identities", "pagerank", "importance"} <= set(imp.columns)

    def test_hub_beats_leaf(self, small_kg, imp):
        edges = entity_edges(small_kg)
        hub = edges.groupBy("dst").count().orderBy(F.desc("count")).first().dst
        leaf = (
            small_kg.select("subject").distinct()
            .join(edges.select(F.col("dst").alias("subject")), "subject", "left_anti")
            .join(edges.select(F.col("src").alias("subject")), "subject", "left_anti")
            .first()
        )
        if leaf is None:
            pytest.skip("no isolated entity")
        vals = {r.subject: r.importance for r in imp.collect()}
        assert vals[hub] > vals[leaf.subject]
