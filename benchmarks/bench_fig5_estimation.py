"""Fig. 5 benchmark: the cost of the two sides of view-size estimation —
the O(1) estimator evaluation vs. actually counting 2-hop paths (what
the estimator lets Kaskade avoid), per dataset.
"""
import pytest

from repro.core.estimator import collect_stats, estimate_khop_paths
from repro.engine.traversal import khop_walk_count

ALL = ["prov_bench", "dblp_bench", "soc_bench", "roadnet_bench"]


@pytest.mark.parametrize("env", ALL)
class TestFig5:
    def test_collect_stats(self, benchmark, env, request):
        """Stats collection (vertex cardinalities + degree percentiles):
        Kaskade pays this once at load time."""
        g, _conn, spec = request.getfixturevalue(env)
        benchmark.group = f"fig5:{spec.name}"
        benchmark.pedantic(lambda: collect_stats(g), rounds=2, iterations=1)

    def test_estimator_evaluation(self, benchmark, env, request):
        g, _conn, spec = request.getfixturevalue(env)
        stats = collect_stats(g)
        benchmark.group = f"fig5:{spec.name}"
        out = benchmark.pedantic(
            lambda: estimate_khop_paths(stats, 2, 95), rounds=5, iterations=100
        )
        assert out > 0

    def test_actual_path_count(self, benchmark, env, request):
        """The ground truth the estimator replaces: a full 2-hop join."""
        g, _conn, spec = request.getfixturevalue(env)
        benchmark.group = f"fig5:{spec.name}"
        out = benchmark.pedantic(
            lambda: khop_walk_count(g.edges, 2), rounds=2, iterations=1
        )
        assert out > 0


class TestFig5Accuracy:
    """Not a timing: records estimate-vs-actual at bench scale so the
    numbers land in bench_output.txt next to the timings."""

    @pytest.mark.parametrize("env", ALL)
    def test_report_accuracy(self, benchmark, env, request, capsys):
        g, _conn, spec = request.getfixturevalue(env)
        benchmark.group = f"fig5:{spec.name}"

        def measure():
            stats = collect_stats(g)
            return (
                stats.n_edges,
                estimate_khop_paths(stats, 2, 50),
                estimate_khop_paths(stats, 2, 95),
                khop_walk_count(g.edges, 2),
            )

        n_e, est50, est95, actual = benchmark.pedantic(measure, rounds=1, iterations=1)
        with capsys.disabled():
            print(
                f"\n[fig5:{spec.name}] |E|={n_e} "
                f"est50={est50:.0f} est95={est95:.0f} actual={actual}"
            )
        assert est50 <= est95
        assert actual > 0
