"""Tests for the cost model (§ V-A): creation cost, eval-cost proxy,
connector stats, and the knapsack value (improvement / creation)."""
import pytest

from repro.core import (
    BLAST_RADIUS_MATCH,
    PROVENANCE_CORE,
    ConnectorCandidate,
    SummarizerCandidate,
    parse_match,
)
from repro.core.cost import CostModel, pattern_max_hops
from repro.core.estimator import GraphStats, TypeStats


@pytest.fixture(scope="module")
def blast():
    return parse_match(BLAST_RADIUS_MATCH)


@pytest.fixture(scope="module")
def stats():
    return GraphStats(
        n_vertices=3000,
        n_edges=7000,
        per_type={
            "Job": TypeStats("Job", 1000, {50: 1.0, 90: 2.0, 95: 3.0, 100: 10.0}),
            "File": TypeStats("File", 2000, {50: 1.0, 90: 1.5, 95: 2.0, 100: 8.0}),
        },
    )


CM = CostModel(schema=PROVENANCE_CORE, alpha=95)
JJ2 = ConnectorCandidate("q_j1", "q_j2", "Job", "Job", 2)


class TestPatternMaxHops:
    def test_blast_radius(self, blast):
        assert pattern_max_hops(blast) == 10  # 2 fixed edges + 0..8 var

    def test_pure_varlength(self):
        q = parse_match("MATCH (a:Job)-[r*1..4]->(b:Job) RETURN a, b")
        assert pattern_max_hops(q) == 4


class TestViewCosts:
    def test_connector_size_formula(self, stats):
        # Job-anchored 2-hop: n_jobs * deg95(Job)^2 = 1000 * 9
        assert CM.view_size(stats, JJ2) == 9000.0

    def test_creation_cost_proportional_to_size(self, stats):
        assert CM.creation_cost(stats, JJ2) == CM.view_size(stats, JJ2)

    def test_summarizer_bounded_by_raw(self, stats):
        sv = SummarizerCandidate("vertex_inclusion", frozenset({"Job", "File"}))
        assert CM.view_size(stats, sv) == stats.n_edges

    def test_unknown_view_type_rejected(self, stats):
        with pytest.raises(TypeError):
            CM.view_size(stats, object())


class TestEvalCost:
    def test_monotone_in_hops(self, stats):
        assert CM.traversal_cost(stats, 4) > CM.traversal_cost(stats, 2)

    def test_eval_cost_uses_pattern_hops(self, stats, blast):
        assert CM.eval_cost(stats, blast) == CM.traversal_cost(stats, 10)

    def test_connector_stats_shape(self, stats):
        cs = CM.connector_stats(stats, JJ2)
        assert cs.n_vertices == 1000
        assert not cs.is_heterogeneous
        (t,) = cs.per_type.values()
        assert t.deg(95) == 9.0  # deg95(Job)^2

    def test_improvement_positive_for_applicable_view(self, stats, blast):
        assert CM.improvement(stats, blast, JJ2) > 1.0

    def test_improvement_zero_for_inapplicable_view(self, stats, blast):
        bad = ConnectorCandidate("q_j1", "q_j2", "Job", "Job", 4)
        assert CM.improvement(stats, blast, bad) == 0.0

    def test_improvement_zero_for_summarizer(self, stats, blast):
        sv = SummarizerCandidate("vertex_inclusion", frozenset({"Job"}))
        assert CM.improvement(stats, blast, sv) == 0.0

    @pytest.mark.parametrize("deg", [1.5, 2.0, 4.0, 8.0])
    def test_improvement_exceeds_one_across_fanouts(self, blast, deg):
        """The connector always wins under the frontier proxy: the
        rewritten plan skips every odd-hop frontier and scans only Job
        vertices. (The *ratio* converges to an asymptote as fan-out
        grows — both plans share the dominant final frontier — so we
        assert the win, not growth.)"""
        stats = GraphStats(
            n_vertices=3000,
            n_edges=int(3000 * deg),
            per_type={
                "Job": TypeStats("Job", 1000, {95: deg}),
                "File": TypeStats("File", 2000, {95: deg}),
            },
        )
        imp = CostModel(PROVENANCE_CORE, 95).improvement(stats, blast, JJ2)
        assert imp > 1.0
