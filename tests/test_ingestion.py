"""Spark tests for source ingestion (§2.2): import, entity transform
integrity checks, PGF ontology alignment, extended-triple export."""
import pandas as pd
import pytest
from pyspark.sql import functions as F

from repro.core import schema as S
from repro.core.ingestion import IngestionPipeline, IntegrityError, pgfs_for
from repro.kgdata.sources import SourceConfig, source_snapshot
from repro.oracle import assert_equivalent

CFG = SourceConfig("ingsrc", ("movie", "person"), coverage=0.9,
                   column_map={"genre": "category"}, split_full_title=True)


@pytest.fixture(scope="module")
def pipeline(tuned_spark):
    return IngestionPipeline(tuned_spark, CFG)


@pytest.fixture(scope="module")
def snap(uni):
    return source_snapshot(uni, CFG, 0)


@pytest.fixture(scope="module")
def exported(pipeline, snap):
    triples, vol = pipeline.run(snap)
    return triples.localCheckpoint(eager=True), vol.localCheckpoint(eager=True)


class TestPGFs:
    def test_rename_pgf_generated(self):
        pgfs = {p.target: p for p in pgfs_for(CFG)}
        assert pgfs["genre"].kind == "rename"
        assert pgfs["genre"].source_cols == ("category",)

    def test_combine_pgf_for_split_title(self):
        pgfs = {p.target: p for p in pgfs_for(CFG)}
        assert pgfs["full_title"].kind == "combine"
        assert pgfs["full_title"].source_cols == ("title", "subtitle")

    def test_unknown_pgf_kind_rejected(self):
        from repro.core.ingestion import PGF

        with pytest.raises(ValueError):
            PGF("exploded", ("a",), "b").expr()


class TestIntegrityChecks:
    def test_missing_id_column(self, pipeline, tuned_spark):
        df = tuned_spark.createDataFrame(pd.DataFrame({"name": ["x"]}))
        with pytest.raises(IntegrityError, match="no ID"):
            pipeline.entity_transform(df)

    def test_null_id(self, pipeline, tuned_spark):
        df = tuned_spark.createDataFrame(
            pd.DataFrame({"id": ["a", None], "name": ["x", "y"]})
        )
        with pytest.raises(IntegrityError, match="without ID"):
            pipeline.entity_transform(df)

    def test_duplicate_ids(self, pipeline, tuned_spark):
        df = tuned_spark.createDataFrame(
            pd.DataFrame({"id": ["a", "a"], "name": ["x", "y"]})
        )
        with pytest.raises(IntegrityError, match="non-unique"):
            pipeline.entity_transform(df)

    def test_duplicate_predicate_names(self, pipeline, tuned_spark):
        df = tuned_spark.createDataFrame(
            pd.DataFrame({"id": ["a"], "name": ["x"]})
        ).select("id", "name", F.col("name").alias("name"))
        with pytest.raises(IntegrityError, match="duplicate predicate"):
            pipeline.entity_transform(df)

    def test_clean_payload_passes(self, pipeline, snap):
        rows = pipeline.import_snapshot(snap)
        assert pipeline.entity_transform(rows).count() == len(snap.entities)


class TestAlignment:
    def test_output_columns_follow_ontology(self, pipeline, snap):
        aligned = pipeline.align(pipeline.import_snapshot(snap))
        cols = set(aligned.columns)
        assert "category" not in cols and "genre" in cols
        assert "full_title" in cols and "title" not in cols

    def test_combine_pgf_joins_title_parts(self, pipeline, snap, uni):
        aligned = pipeline.align(pipeline.import_snapshot(snap))
        row = (
            aligned.filter(F.col("full_title").isNotNull())
            .select("full_title")
            .first()
        )
        assert ": " in row.full_title


class TestExport:
    def test_schema(self, exported):
        triples, vol = exported
        assert [f.name for f in triples.schema.fields] == [
            f.name for f in S.SOURCE_TRIPLE_SCHEMA.fields
        ]

    def test_every_record_has_name_and_type(self, exported, snap):
        triples, _ = exported
        names = triples.filter(F.col("predicate") == S.NAME_PRED).count()
        types = triples.filter(F.col("predicate") == S.TYPE_PRED).count()
        assert names == len(snap.entities)
        assert types == len(snap.entities)

    def test_no_null_objects(self, exported):
        triples, _ = exported
        assert triples.filter(F.col("obj").isNull()).count() == 0

    def test_composite_rows_carry_r_ids(self, exported, snap):
        triples, _ = exported
        comp = triples.filter(F.col("r_id").isNotNull())
        assert comp.count() == len(snap.rels)
        bad = comp.filter(~F.col("r_id").contains("#")).count()
        assert bad == 0

    def test_provenance_constant(self, exported):
        triples, _ = exported
        rows = triples.select("source", "trust").distinct().collect()
        assert rows == [rows[0]]
        assert rows[0].source == "ingsrc" and rows[0].trust == CFG.trust

    def test_volatile_export(self, exported, snap):
        _, vol = exported
        assert vol.count() == len(snap.popularity)
        assert vol.select("predicate").distinct().first().predicate == "popularity"

    def test_simple_fact_count_matches_oracle(self, exported, pipeline, snap):
        """Cross-check the unpivot against DuckDB over the aligned frame."""
        triples, _ = exported
        aligned = pipeline.align(pipeline.import_snapshot(snap))
        pred_cols = [c for c in aligned.columns if c != "id"]
        got = (
            triples.filter(F.col("r_id").isNull())
            .groupBy("predicate")
            .agg(F.count("*").alias("n"))
        )
        sql = " UNION ALL ".join(
            f"SELECT '{c}' AS predicate, count(\"{c}\") AS n FROM aligned "
            f"WHERE \"{c}\" IS NOT NULL GROUP BY 1"
            for c in pred_cols
        )
        assert_equivalent(got, sql, aligned=aligned)

    def test_empty_snapshot_yields_empty_payload(self, tuned_spark, uni):
        late = SourceConfig("late", ("person",), onboard_tick=9)
        triples, vol = IngestionPipeline(tuned_spark, late).run(
            source_snapshot(uni, late, 0)
        )
        assert triples.count() == 0 and vol.count() == 0
