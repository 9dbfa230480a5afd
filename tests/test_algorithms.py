"""Tests for deterministic label propagation (Q7 substrate) against the
pandas reference, routed through the DuckDB oracle."""
import pytest

from repro.oracle import assert_equivalent
from repro.views import (
    community_sizes,
    label_propagation,
    label_propagation_reference,
    largest_community,
    undirected_neighbors,
)


class TestUndirectedNeighbors:
    def test_both_directions(self, fig3):
        nbrs = undirected_neighbors(fig3)
        got = {(r["id"], r["nbr"]) for r in nbrs.collect()}
        assert (1, 11) in got and (11, 1) in got

    def test_dedup(self, cyclic):
        nbrs = undirected_neighbors(cyclic)
        assert nbrs.count() == nbrs.distinct().count()


class TestLabelPropagation:
    @pytest.mark.parametrize("iters", [0, 1, 2, 3])
    def test_fig3_matches_reference(self, fig3, fig3_pdf, iters):
        vertices, edges = fig3_pdf
        got = label_propagation(fig3, iters)
        ref = label_propagation_reference(vertices, edges, iters)
        assert_equivalent(got, "SELECT id, community FROM ref", ref=ref)

    @pytest.mark.parametrize("iters", [1, 2, 4])
    def test_cyclic_matches_reference(self, cyclic, cyclic_pdf, iters):
        vertices, edges = cyclic_pdf
        got = label_propagation(cyclic, iters)
        ref = label_propagation_reference(vertices, edges, iters)
        assert_equivalent(got, "SELECT id, community FROM ref", ref=ref)

    def test_tiny_prov_matches_reference(self, tiny_prov):
        vertices = tiny_prov.vertices.toPandas()
        edges = tiny_prov.edges.toPandas()
        got = label_propagation(tiny_prov, 3)
        ref = label_propagation_reference(vertices, edges, 3)
        assert_equivalent(got, "SELECT id, community FROM ref", ref=ref)

    def test_zero_iterations_identity(self, fig3):
        got = label_propagation(fig3, 0)
        assert all(r["id"] == r["community"] for r in got.collect())

    def test_negative_rejected(self, fig3):
        with pytest.raises(ValueError):
            label_propagation(fig3, -1)

    def test_isolated_vertex_keeps_label(self, spark):
        import pandas as pd

        from repro.engine import graph_from_pandas

        g = graph_from_pandas(
            spark,
            pd.DataFrame({"id": [1, 2, 3], "vtype": "Vertex"}),
            pd.DataFrame({"src": [1], "dst": [2], "etype": ["L"], "ts": [0]}),
        )
        got = {r["id"]: r["community"] for r in label_propagation(g, 5).collect()}
        assert got[3] == 3

    def test_converges_on_clique_to_min_label(self, spark):
        import pandas as pd

        from repro.engine import graph_from_pandas

        # triangle 5-6-7: all should converge to label 5
        g = graph_from_pandas(
            spark,
            pd.DataFrame({"id": [5, 6, 7], "vtype": "Vertex"}),
            pd.DataFrame(
                {"src": [5, 6, 7], "dst": [6, 7, 5], "etype": "L", "ts": 0}
            ),
        )
        got = {r["id"]: r["community"] for r in label_propagation(g, 4).collect()}
        assert set(got.values()) == {5}


class TestCommunityQueries:
    def test_sizes_by_type(self, fig3):
        labels = label_propagation(fig3, 2)
        sizes = community_sizes(labels, fig3, vtype="Job")
        total = sum(r["size"] for r in sizes.collect())
        assert total == 4  # every job in exactly one community

    def test_largest_community_subgraph(self, fig3):
        labels = label_propagation(fig3, 2)
        com, sub = largest_community(labels, fig3, vtype="Job")
        assert sub.vertex_count() >= 1
        # induced edges: both endpoints inside
        ids = {r["id"] for r in sub.vertices.collect()}
        for r in sub.edges.collect():
            assert r["src"] in ids and r["dst"] in ids

    def test_largest_community_no_such_type(self, fig3):
        labels = label_propagation(fig3, 1)
        with pytest.raises(ValueError):
            largest_community(labels, fig3, vtype="Ghost")
