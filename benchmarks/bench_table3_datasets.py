"""Table III benchmark: dataset generation cost at bench scale, with the
resulting |V|/|E| printed alongside (the SF-scaled Table III itself).
"""
import pytest

from repro.datasets import dblp, prov_raw, roadnet, social
from repro.workload import PROFILES

S = PROFILES["bench"]


class TestGeneration:
    def test_prov_raw(self, benchmark, spark):
        benchmark.group = "table3:generate"
        out = benchmark.pedantic(
            lambda: prov_raw(spark, scale=S["prov"]).edge_count(),
            rounds=2, iterations=1,
        )
        assert out > 0

    def test_dblp(self, benchmark, spark):
        benchmark.group = "table3:generate"
        out = benchmark.pedantic(
            lambda: dblp(spark, scale=S["dblp"]).edge_count(), rounds=2, iterations=1
        )
        assert out > 0

    def test_social(self, benchmark, spark):
        benchmark.group = "table3:generate"
        out = benchmark.pedantic(
            lambda: social(spark, scale=S["soc"]).edge_count(), rounds=2, iterations=1
        )
        assert out > 0

    def test_roadnet(self, benchmark, spark):
        benchmark.group = "table3:generate"
        out = benchmark.pedantic(
            lambda: roadnet(spark, scale=S["roadnet"]).edge_count(),
            rounds=2, iterations=1,
        )
        assert out > 0


class TestTable3Report:
    """Prints the SF-scaled Table III into bench_output.txt."""

    def test_report(self, benchmark, spark, capsys):
        from repro.workload import format_rows, table3_rows

        benchmark.group = "table3:generate"
        rows = benchmark.pedantic(
            lambda: table3_rows(spark, "bench"), rounds=1, iterations=1
        )
        with capsys.disabled():
            print("\n=== Table III (bench profile) ===")
            print(format_rows(rows))
        assert len(rows) == 6
