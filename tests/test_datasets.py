"""Tests for the synthetic dataset generators (Table III substitutes).

Each generator must be deterministic, schema-conformant (only
schema-legal edge types between the right vertex types), and exhibit
the structural properties its experiments rely on (acyclic lineage,
power-law degrees, bounded road degrees).
"""
import numpy as np
import pytest
from pyspark.sql import functions as F

from repro.core.schema import DBLP_FULL, PROVENANCE_FULL
from repro.datasets import dblp, dblp_summarized, prov_raw, prov_summarized, roadnet, social


def _assert_schema_conformant(graph, schema):
    """Every edge's (src vtype, dst vtype, etype) must be in the schema."""
    legal = {(e.src_type, e.dst_type, e.etype) for e in schema.edges}
    vt = graph.vertices.select("id", "vtype")
    triples = (
        graph.edges.join(vt.withColumnRenamed("id", "src")
                         .withColumnRenamed("vtype", "st"), "src")
        .join(vt.withColumnRenamed("id", "dst").withColumnRenamed("vtype", "dt"), "dst")
        .select("st", "dt", "etype")
        .distinct()
        .collect()
    )
    got = {(r["st"], r["dt"], r["etype"]) for r in triples}
    assert got <= legal, f"illegal edge triples: {got - legal}"


class TestProv:
    def test_schema_conformance(self, tiny_prov):
        _assert_schema_conformant(tiny_prov, PROVENANCE_FULL)

    def test_referential_integrity(self, tiny_prov):
        tiny_prov.validate_referential_integrity()

    def test_all_five_types_present(self, tiny_prov):
        assert tiny_prov.vertex_types() == ["File", "Job", "Machine", "Task", "User"]

    def test_deterministic(self, spark):
        a = prov_raw(spark, scale=0.03).edges.toPandas()
        b = prov_raw(spark, scale=0.03).edges.toPandas()
        assert a.equals(b)

    def test_acyclic_lineage(self, tiny_prov):
        """Reads only flow from earlier jobs' files: writer(file) < reader."""
        writes = tiny_prov.edges.where("etype = 'WRITES_TO'").select(
            F.col("src").alias("writer"), F.col("dst").alias("file")
        )
        reads = tiny_prov.edges.where("etype = 'IS_READ_BY'").select(
            F.col("src").alias("file"), F.col("dst").alias("reader")
        )
        bad = writes.join(reads, "file").where("writer >= reader").count()
        assert bad == 0

    def test_every_file_written_once(self, tiny_prov):
        writes = tiny_prov.edges.where("etype = 'WRITES_TO'")
        assert (
            writes.groupBy("dst").count().where("count > 1").count() == 0
        )
        n_files = tiny_prov.typed_vertices("File").count()
        assert writes.count() == n_files

    def test_jobs_have_cpu_and_pipeline(self, tiny_prov):
        jobs = tiny_prov.typed_vertices("Job")
        assert jobs.where("cpu IS NULL OR pname IS NULL").count() == 0

    def test_summarized_is_core_types(self, spark):
        g = prov_summarized(spark, scale=0.03)
        assert g.vertex_types() == ["File", "Job"]
        assert set(g.edge_types()) == {"WRITES_TO", "IS_READ_BY"}

    def test_scale_grows_graph(self, spark):
        small = prov_raw(spark, scale=0.02)
        big = prov_raw(spark, scale=0.06)
        assert big.edge_count() > small.edge_count() * 2

    def test_file_out_degree_skewed(self, tiny_prov):
        """Cross-pipeline reference reads give files a heavy-tailed
        read fan-out (the Fig. 8 shape)."""
        deg = (
            tiny_prov.edges.where("etype = 'IS_READ_BY'")
            .groupBy("src")
            .count()
            .agg(F.max("count").alias("mx"), F.expr("percentile(count, 0.5)").alias("md"))
            .collect()[0]
        )
        assert deg["mx"] >= 5 * deg["md"]


class TestDblp:
    def test_schema_conformance(self, tiny_dblp):
        _assert_schema_conformant(tiny_dblp, DBLP_FULL)

    def test_referential_integrity(self, tiny_dblp):
        tiny_dblp.validate_referential_integrity()

    def test_authorship_is_symmetric(self, tiny_dblp):
        wrote = {
            (r["src"], r["dst"])
            for r in tiny_dblp.edges.where("etype = 'WROTE'").collect()
        }
        written = {
            (r["dst"], r["src"])
            for r in tiny_dblp.edges.where("etype = 'WRITTEN_BY'").collect()
        }
        assert wrote == written

    def test_deterministic(self, spark):
        a = dblp(spark, scale=0.03).edges.toPandas()
        b = dblp(spark, scale=0.03).edges.toPandas()
        assert a.equals(b)

    def test_summarized_drops_venues(self, spark):
        g = dblp_summarized(spark, scale=0.03)
        assert "Venue" not in g.vertex_types()
        assert "PUBLISHED_IN" not in g.edge_types()

    def test_author_degree_skewed(self, tiny_dblp):
        """Prolific authors exist: the max authorship degree sits well
        above the median (the within-community zipf rank preference).
        Small repeat-collaborator communities bound the spread, so the
        factor is milder than soc's hub skew."""
        deg = (
            tiny_dblp.edges.where("etype = 'WROTE'")
            .groupBy("src")
            .count()
            .agg(F.max("count").alias("mx"), F.expr("percentile(count, 0.5)").alias("md"))
            .collect()[0]
        )
        assert deg["mx"] >= 2 * deg["md"]


class TestSocial:
    @pytest.fixture(scope="class")
    def g(self, spark):
        return social(spark, scale=0.3).persist()

    def test_homogeneous(self, g):
        assert g.vertex_types() == ["Vertex"]
        assert g.edge_types() == ["LINK"]

    def test_no_self_loops_or_duplicates(self, g):
        assert g.edges.where("src = dst").count() == 0
        assert g.edges.count() == g.edges.select("src", "dst").distinct().count()

    def test_power_law_shape(self, g):
        """Power-law check: max degree far above median, and the CCDF is
        convex on log-log (heavier than exponential tail)."""
        deg = g.edges.groupBy("src").count().toPandas()["count"].to_numpy()
        assert deg.max() >= 10 * np.median(deg)

    def test_deterministic(self, spark):
        a = social(spark, scale=0.1).edges.toPandas()
        b = social(spark, scale=0.1).edges.toPandas()
        assert a.equals(b)

    def test_referential_integrity(self, g):
        g.validate_referential_integrity()


class TestRoadnet:
    @pytest.fixture(scope="class")
    def g(self, spark):
        return roadnet(spark, scale=0.2).persist()

    def test_degree_bounded_by_four(self, g):
        mx = g.edges.groupBy("src").count().agg(F.max("count")).collect()[0][0]
        assert mx <= 4

    def test_mostly_symmetric(self, g):
        fwd = {(r["src"], r["dst"]) for r in g.edges.collect()}
        assert all((b, a) in fwd for a, b in fwd)

    def test_deterministic(self, spark):
        a = roadnet(spark, scale=0.1).edges.toPandas()
        b = roadnet(spark, scale=0.1).edges.toPandas()
        assert a.equals(b)

    def test_not_power_law(self, g):
        """Near-constant degree: max degree ≈ median (contrast with soc)."""
        deg = g.edges.groupBy("src").count().toPandas()["count"].to_numpy()
        assert deg.max() <= 2 * np.median(deg)

    def test_referential_integrity(self, g):
        g.validate_referential_integrity()
