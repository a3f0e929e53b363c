"""Spark tests for delta computation (§2.2/§2.4), oracle-checked."""
import pytest
from pyspark.sql import functions as F

from repro.core.delta import compute_delta, entity_fingerprints
from repro.core.ingestion import IngestionPipeline
from repro.kgdata.sources import SourceConfig, source_snapshot
from repro.oracle import assert_equivalent

CFG = SourceConfig("deltasrc", ("person", "city"), coverage=0.9, delete_prob=0.25)


@pytest.fixture(scope="module")
def snaps(tuned_spark, uni):
    pipe = IngestionPipeline(tuned_spark, CFG)
    out = []
    for tick in (0, 5):
        triples, _ = pipe.run(source_snapshot(uni, CFG, tick))
        out.append(triples.localCheckpoint(eager=True))
    return out


class TestFingerprints:
    def test_one_row_per_entity(self, snaps):
        fp = entity_fingerprints(snaps[0])
        assert fp.count() == snaps[0].select("subject").distinct().count()

    def test_fingerprint_deterministic(self, snaps):
        a = {r.subject: r.fingerprint for r in entity_fingerprints(snaps[0]).collect()}
        b = {r.subject: r.fingerprint for r in entity_fingerprints(snaps[0]).collect()}
        assert a == b

    def test_fingerprint_order_independent(self, tuned_spark, snaps):
        shuffled = snaps[0].orderBy(F.rand(42))
        a = {r.subject: r.fingerprint for r in entity_fingerprints(snaps[0]).collect()}
        b = {r.subject: r.fingerprint for r in entity_fingerprints(shuffled).collect()}
        assert a == b


class TestClassification:
    def test_new_source_is_full_added(self, snaps):
        d = compute_delta(None, snaps[0])
        c = d.counts()
        assert c["updated_entities"] == 0 and c["deleted_entities"] == 0
        assert c["added_entities"] == snaps[0].select("subject").distinct().count()

    def test_identical_snapshots_produce_empty_delta(self, snaps):
        d = compute_delta(snaps[0], snaps[0])
        assert d.counts() == {
            "added_entities": 0, "updated_entities": 0, "deleted_entities": 0,
        }

    def test_partitions_are_disjoint_and_exhaustive(self, snaps):
        prev, cur = snaps
        d = compute_delta(prev, cur)
        added = {r.subject for r in d.added.select("subject").distinct().collect()}
        updated = {r.subject for r in d.updated.select("subject").distinct().collect()}
        deleted = {r.subject for r in d.deleted.collect()}
        prev_ids = {r.subject for r in prev.select("subject").distinct().collect()}
        cur_ids = {r.subject for r in cur.select("subject").distinct().collect()}
        assert added == cur_ids - prev_ids
        assert deleted == prev_ids - cur_ids
        assert updated <= prev_ids & cur_ids
        assert not added & updated

    def test_changes_actually_exist_between_ticks(self, snaps):
        d = compute_delta(*snaps)
        c = d.counts()
        assert c["added_entities"] > 0
        assert c["updated_entities"] > 0
        assert c["deleted_entities"] > 0

    def test_added_payload_carries_full_entities(self, snaps):
        prev, cur = snaps
        d = compute_delta(prev, cur)
        per_entity = d.added.groupBy("subject").count()
        assert per_entity.filter(F.col("count") < 2).count() == 0

    def test_classification_matches_oracle(self, snaps):
        """The Added/Deleted/Updated split is a full-outer-join in SQL —
        check the Spark classification against DuckDB."""
        prev, cur = snaps
        d = compute_delta(prev, cur)
        got_parts = [
            d.added.select("subject").distinct().withColumn("part", F.lit("added")),
            d.deleted.withColumn("part", F.lit("deleted")),
            d.updated.select("subject").distinct().withColumn("part", F.lit("updated")),
        ]
        got = got_parts[0].unionByName(got_parts[1]).unionByName(got_parts[2])
        fp_prev = entity_fingerprints(prev)
        fp_cur = entity_fingerprints(cur)
        sql = """
            SELECT COALESCE(p.subject, c.subject) AS subject,
                   CASE WHEN p.subject IS NULL THEN 'added'
                        WHEN c.subject IS NULL THEN 'deleted'
                        ELSE 'updated' END AS part
            FROM fp_prev p FULL OUTER JOIN fp_cur c ON p.subject = c.subject
            WHERE p.subject IS NULL OR c.subject IS NULL
                  OR p.fingerprint <> c.fingerprint
        """
        assert_equivalent(got, sql, fp_prev=fp_prev, fp_cur=fp_cur)
