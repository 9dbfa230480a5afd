"""Tests for view-based query rewriting (§ V-C): hop-count mapping,
equivalence preconditions, and best-rewriting choice."""
import pytest

from repro.core import (
    BLAST_RADIUS_MATCH,
    HOMOGENEOUS,
    PROVENANCE_CORE,
    ConnectorCandidate,
    ViewEnumerator,
    parse_match,
)
from repro.core.rewriter import (
    best_rewriting,
    feasible_hop_counts,
    rewrite_with_connector,
)


@pytest.fixture(scope="module")
def blast():
    return parse_match(BLAST_RADIUS_MATCH)


JJ2 = ConnectorCandidate("q_j1", "q_j2", "Job", "Job", 2)


class TestFeasibleHops:
    def test_blast_radius_even_hops(self, blast):
        ks = feasible_hop_counts(blast, PROVENANCE_CORE, "q_j1", "q_j2")
        assert ks == [2, 4, 6, 8, 10]

    def test_file_pair_hops(self, blast):
        ks = feasible_hop_counts(blast, PROVENANCE_CORE, "q_f1", "q_f2")
        # queryKHopPath gives 0..8; 0 dropped; odd dropped by schema.
        assert ks == [2, 4, 6, 8]

    def test_single_edge(self, blast):
        assert feasible_hop_counts(blast, PROVENANCE_CORE, "q_j1", "q_f1") == [1]


class TestRewriteWithConnector:
    def test_blast_radius_over_2hop(self, blast):
        """Lst. 1 → Lst. 4: MATCH over the job-to-job connector with
        bounds 1..5 (K ∈ {2,…,10} — the paper's *1..4 is a typo, see
        DESIGN.md)."""
        rw = rewrite_with_connector(blast, JJ2, PROVENANCE_CORE)
        assert rw is not None
        assert (rw.lower, rw.upper) == (1, 5)
        (p,) = rw.rewritten.paths
        assert p.etype == "CONN2_Job_Job"
        assert rw.rewritten.edges == ()
        assert rw.rewritten.returns == (("q_j1", "A"), ("q_j2", "B"))

    def test_rewritten_vertex_types(self, blast):
        rw = rewrite_with_connector(blast, JJ2, PROVENANCE_CORE)
        assert {v.vtype for v in rw.rewritten.vertices} == {"Job"}

    @pytest.mark.parametrize("k", [4, 6, 8, 10])
    def test_larger_k_not_equivalence_preserving(self, blast, k):
        """A k=4 connector loses K ∈ {2, 6, 10} paths — must be refused."""
        cand = ConnectorCandidate("q_j1", "q_j2", "Job", "Job", k)
        assert rewrite_with_connector(blast, cand, PROVENANCE_CORE) is None

    def test_wrong_anchor_vars_refused(self, blast):
        cand = ConnectorCandidate("q_f1", "q_f2", "File", "File", 2)
        assert rewrite_with_connector(blast, cand, PROVENANCE_CORE) is None

    def test_disconnected_anchors_refused(self):
        q = parse_match(
            "MATCH (a:Job)-[:WRITES_TO]->(f:File), (g:File)-[:IS_READ_BY]->(b:Job) "
            "RETURN a AS A, b AS B"
        )
        # a ⇝ b has no path in the pattern: no feasible hop counts.
        cand = ConnectorCandidate("a", "b", "Job", "Job", 2)
        assert rewrite_with_connector(q, cand, PROVENANCE_CORE) is None

    def test_ancestor_style_query(self):
        q = parse_match("MATCH (a:Job)-[r*1..4]->(b:Job) RETURN a AS S, b AS T")
        rw = rewrite_with_connector(q, ConnectorCandidate("a", "b", "Job", "Job", 2),
                                    PROVENANCE_CORE)
        assert rw is not None and (rw.lower, rw.upper) == (1, 2)

    def test_homogeneous_odd_hops_refused(self):
        """On a homogeneous schema all K ∈ 1..4 are feasible; an exact
        2-hop connector misses odd-length paths."""
        q = parse_match("MATCH (a:Vertex)-[r*1..4]->(b:Vertex) RETURN a AS S, b AS T")
        rw = rewrite_with_connector(
            q, ConnectorCandidate("a", "b", "Vertex", "Vertex", 2), HOMOGENEOUS
        )
        assert rw is None


class TestBestRewriting:
    def test_picks_cheapest_applicable(self, blast):
        views = [
            ConnectorCandidate("q_j1", "q_j2", "Job", "Job", 2),
            ConnectorCandidate("q_j1", "q_j2", "Job", "Job", 4),  # inapplicable
        ]
        rw = best_rewriting(blast, views, PROVENANCE_CORE, cost_of=lambda r: r.upper)
        assert rw is not None and rw.view.k == 2

    def test_none_when_no_view_applies(self, blast):
        views = [ConnectorCandidate("q_j1", "q_j2", "Job", "Job", 4)]
        assert best_rewriting(blast, views, PROVENANCE_CORE, lambda r: 0) is None

    def test_cost_tie_break_is_first_seen(self, blast):
        v = ConnectorCandidate("q_j1", "q_j2", "Job", "Job", 2)
        rw = best_rewriting(blast, [v, v], PROVENANCE_CORE, lambda r: 1.0)
        assert rw.view is v


class TestEndToEndWithEnumerator:
    def test_enumerated_candidates_rewrite_consistently(self, blast):
        """Every enumerated candidate either rewrites equivalently or is
        refused; at least the k=2 one succeeds."""
        enum = ViewEnumerator(PROVENANCE_CORE)
        ok = {}
        for cand in enum.khop_connectors(blast):
            rw = rewrite_with_connector(blast, cand, PROVENANCE_CORE)
            ok[cand.k] = rw is not None
        assert ok == {2: True, 4: False, 6: False, 8: False, 10: False}
