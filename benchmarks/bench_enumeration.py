"""§ IV benchmark: constraint-based view enumeration cost.

The paper reports that enumeration adds only milliseconds to a query
(§ VII-A) and that constraints shrink the search space (§ IV-A2). We
benchmark: (a) the full constrained enumeration for the blast-radius
query; (b) the constraint-mining step alone; (c) the knapsack solve; and
record the search-space ratio claim as a printed row.
"""
import pytest

from repro.core import (
    BLAST_RADIUS_MATCH,
    PROVENANCE_CORE,
    ViewEnumerator,
    parse_match,
    query_facts,
    schema_facts,
    unconstrained_schema_walk_count,
)
from repro.core.selection import KnapsackItem, knapsack_branch_and_bound


@pytest.fixture(scope="module")
def blast():
    return parse_match(BLAST_RADIUS_MATCH)


class TestEnumeration:
    def test_constrained_enumeration(self, benchmark, blast):
        enum = ViewEnumerator(PROVENANCE_CORE)
        benchmark.group = "enumeration"
        out = benchmark.pedantic(
            lambda: enum.khop_connectors(blast), rounds=5, iterations=2
        )
        assert len(out) == 5

    def test_constraint_mining(self, benchmark, blast):
        benchmark.group = "enumeration"
        out = benchmark.pedantic(
            lambda: query_facts(blast) + schema_facts(PROVENANCE_CORE),
            rounds=5,
            iterations=20,
        )
        assert len(out) == 19

    def test_full_enumeration_all_templates(self, benchmark, blast):
        enum = ViewEnumerator(PROVENANCE_CORE)
        benchmark.group = "enumeration"
        out = benchmark.pedantic(lambda: enum.enumerate(blast), rounds=3, iterations=1)
        assert len(out) >= 6

    def test_report_search_space_ratio(self, benchmark, blast, capsys):
        """§ IV-A2: candidates surviving constraints vs. the raw
        template search space (k ≤ 10 × 4 type pairs over schema walks).
        Benchmark-backed so the row lands in bench_output.txt."""
        enum = ViewEnumerator(PROVENANCE_CORE)
        benchmark.group = "enumeration"

        def measure():
            survived = len(enum.khop_connectors(blast, projected_only=False))
            raw_space = sum(
                unconstrained_schema_walk_count(PROVENANCE_CORE, k) * 4
                for k in range(1, 11)
            )
            return survived, raw_space

        survived, raw_space = benchmark.pedantic(measure, rounds=1, iterations=1)
        with capsys.disabled():
            print(
                f"\n[enumeration] constrained candidates={survived} "
                f"unconstrained k<=10 slots={raw_space}"
            )
        assert survived < raw_space


class TestKnapsack:
    def test_branch_and_bound_200_items(self, benchmark):
        import random

        rng = random.Random(5)
        items = [
            KnapsackItem(view=i, weight=rng.randint(1, 50), value=rng.random() * 10)
            for i in range(200)
        ]
        benchmark.group = "selection"
        chosen, value = benchmark.pedantic(
            lambda: knapsack_branch_and_bound(items, 500), rounds=3, iterations=1
        )
        assert value > 0
