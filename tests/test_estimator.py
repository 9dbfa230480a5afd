"""Tests for the view-size estimators (§ V-A, Eqs. 1–3) — pure formula
tests here; Spark-side stats collection is covered in test_stats.py."""
import math

import pytest

from repro.core.estimator import (
    GraphStats,
    TypeStats,
    er_estimate,
    estimate_connector_size,
    estimate_khop_paths,
    heterogeneous_estimate,
    homogeneous_estimate,
)


def _homog(n, degs):
    return GraphStats(
        n_vertices=n,
        n_edges=int(n * degs[50]),
        per_type={"Vertex": TypeStats("Vertex", n, dict(degs))},
    )


def _hetero(spec):
    per = {
        t: TypeStats(t, n, dict(degs), is_source=src)
        for t, (n, degs, src) in spec.items()
    }
    return GraphStats(
        n_vertices=sum(t.n_vertices for t in per.values()),
        n_edges=0,
        per_type=per,
    )


DEGS = {50: 2.0, 90: 5.0, 95: 8.0, 100: 20.0}


class TestErdosRenyi:
    def test_matches_direct_formula_small(self):
        n, m, k = 20, 40, 3
        direct = math.comb(n, k + 1) * (m / math.comb(n, 2)) ** k
        assert er_estimate(n, m, k) == pytest.approx(direct, rel=1e-9)

    def test_no_overflow_at_paper_scale(self):
        # 4.8M vertices / 68.9M edges (soc-livejournal), k=2.
        out = er_estimate(4_800_000, 68_900_000, 2)
        assert 0 < out < math.inf

    def test_er_underestimates_skewed_graph(self):
        """The paper's point: ER underestimates real graphs by orders of
        magnitude. A star graph: n-1 leaves -> hub -> n-1 leaves gives
        (n-1)(n-2) 2-paths; ER with the same n, m predicts ~4."""
        n = 1002
        m = 2 * (n - 2)  # star in + star out
        actual_2paths = (n - 2) * (n - 3)
        assert er_estimate(n, m, 2) < actual_2paths / 100

    def test_zero_edges(self):
        assert er_estimate(100, 0, 2) == 0.0

    def test_k_longer_than_graph(self):
        assert er_estimate(3, 3, 5) == 0.0


class TestHomogeneous:
    def test_formula(self):
        stats = _homog(1000, DEGS)
        assert homogeneous_estimate(stats, 2, 95) == 1000 * 8.0**2
        assert homogeneous_estimate(stats, 3, 50) == 1000 * 2.0**3

    def test_alpha_monotone(self):
        stats = _homog(1000, DEGS)
        assert (
            homogeneous_estimate(stats, 2, 50)
            < homogeneous_estimate(stats, 2, 95)
            < homogeneous_estimate(stats, 2, 100)
        )

    def test_alpha_100_upper_bounds_walk_count(self):
        """With max degree d, k-walk count <= n * d^k (§ V-A argument)."""
        stats = _homog(50, {100: 3.0, 95: 2.0, 50: 1.0})
        # worst case: every vertex has out-degree exactly 3
        assert homogeneous_estimate(stats, 4, 100) >= 50 * 3**4

    def test_rejects_heterogeneous(self):
        stats = _hetero({"A": (10, DEGS, True), "B": (10, DEGS, True)})
        with pytest.raises(ValueError):
            homogeneous_estimate(stats, 2, 95)

    def test_missing_alpha_raises(self):
        stats = _homog(10, {50: 1.0})
        with pytest.raises(KeyError):
            homogeneous_estimate(stats, 2, 95)


class TestHeterogeneous:
    def test_sums_over_source_types_only(self):
        stats = _hetero(
            {
                "Job": (100, {95: 3.0}, True),
                "File": (200, {95: 2.0}, True),
                "Venue": (50, {95: 0.0}, False),  # never a source
            }
        )
        expected = 100 * 3.0**2 + 200 * 2.0**2
        assert heterogeneous_estimate(stats, 2, 95) == expected

    def test_dispatch(self):
        homog = _homog(100, DEGS)
        het = _hetero({"A": (100, DEGS, True), "B": (5, DEGS, True)})
        assert estimate_khop_paths(homog, 2, 95) == homogeneous_estimate(homog, 2, 95)
        assert estimate_khop_paths(het, 2, 95) == heterogeneous_estimate(het, 2, 95)


class TestConnectorSize:
    def test_restricted_to_source_type(self):
        stats = _hetero({"Job": (100, {95: 3.0}, True), "File": (200, {95: 9.0}, True)})
        assert estimate_connector_size(stats, "Job", 2, 95) == 100 * 9.0
        assert estimate_connector_size(stats, "File", 2, 95) == 200 * 81.0

    def test_unknown_type_is_zero(self):
        stats = _homog(10, DEGS)
        assert estimate_connector_size(stats, "Ghost", 2, 95) == 0.0
