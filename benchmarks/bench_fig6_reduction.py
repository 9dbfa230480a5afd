"""Fig. 6 benchmark: cost of materializing the summarizer and the 2-hop
connector on the heterogeneous graphs, with the achieved size reductions
printed alongside (§ VII-E).
"""
import pytest
from pyspark.sql import functions as F

from repro.views import keep_vertex_types, khop_connector
from repro.workload import dblp_spec, prov_spec


def _count(g):
    return g.vertices.count() + g.edges.count()


class TestProvReduction:
    def test_summarizer_materialization(self, benchmark, prov_raw_bench):
        benchmark.group = "fig6:prov"
        out = benchmark.pedantic(
            lambda: _count(keep_vertex_types(prov_raw_bench, {"Job", "File"})),
            rounds=2,
            iterations=1,
        )
        assert out > 0

    def test_connector_materialization(self, benchmark, prov_bench):
        g, _conn, spec = prov_bench
        benchmark.group = "fig6:prov"
        out = benchmark.pedantic(
            lambda: khop_connector(g, 2, spec.anchor_type, spec.anchor_type)
            .edges.count(),
            rounds=2,
            iterations=1,
        )
        assert out > 0

    def test_report_reduction(self, benchmark, prov_raw_bench, prov_bench, capsys):
        g, conn, _spec = prov_bench
        benchmark.group = "fig6:prov"
        raw_e, summ_e, conn_e = benchmark.pedantic(
            lambda: (prov_raw_bench.edge_count(), g.edge_count(), conn.edge_count()),
            rounds=1,
            iterations=1,
        )
        with capsys.disabled():
            print(
                f"\n[fig6:prov] raw |E|={raw_e} summarizer |E|={summ_e} "
                f"({raw_e / summ_e:.1f}x) connector |E|={conn_e} "
                f"({summ_e / conn_e:.1f}x further, {raw_e / conn_e:.1f}x total)"
            )
        assert raw_e > summ_e > conn_e


class TestDblpReduction:
    def test_summarizer_materialization(self, benchmark, dblp_raw_bench):
        benchmark.group = "fig6:dblp"
        out = benchmark.pedantic(
            lambda: _count(
                keep_vertex_types(
                    dblp_raw_bench, {"Author", "Article", "Inproc", "Publication"}
                )
            ),
            rounds=2,
            iterations=1,
        )
        assert out > 0

    def test_connector_materialization(self, benchmark, dblp_bench):
        g, _conn, spec = dblp_bench
        benchmark.group = "fig6:dblp"
        out = benchmark.pedantic(
            lambda: khop_connector(g, 2, spec.anchor_type, spec.anchor_type)
            .edges.count(),
            rounds=2,
            iterations=1,
        )
        assert out > 0

    def test_report_reduction(self, benchmark, dblp_raw_bench, dblp_bench, capsys):
        g, conn, _spec = dblp_bench
        benchmark.group = "fig6:dblp"
        raw_e, summ_e, conn_e = benchmark.pedantic(
            lambda: (dblp_raw_bench.edge_count(), g.edge_count(), conn.edge_count()),
            rounds=1,
            iterations=1,
        )
        with capsys.disabled():
            print(
                f"\n[fig6:dblp] raw |E|={raw_e} summarizer |E|={summ_e} "
                f"({raw_e / summ_e:.1f}x) connector |E|={conn_e} "
                f"({summ_e / conn_e:.1f}x further, {raw_e / conn_e:.1f}x total)"
            )
        assert raw_e > summ_e > conn_e
