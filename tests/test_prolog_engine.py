"""Unit tests for the mini-Prolog inference engine substrate.

The engine must faithfully run the paper's rule listings, so these
tests cover unification, SLD search, NAF, arithmetic, and every builtin
the rule library uses.
"""
import pytest

from repro.prolog import (
    Engine,
    PrologError,
    StepLimitExceeded,
    Struct,
    Var,
    from_list,
    s,
    to_list,
    unify,
)


@pytest.fixture()
def eng():
    return Engine()


# ---------------------------------------------------------------- terms


class TestUnification:
    def test_atom_atom_equal(self):
        assert unify("a", "a", {}) == {}

    def test_atom_atom_unequal(self):
        assert unify("a", "b", {}) is None

    def test_int_float_equal_value(self):
        assert unify(1, 1.0, {}) == {}

    def test_number_atom_never_unify(self):
        assert unify(1, "1", {}) is None

    def test_var_binds_atom(self):
        x = Var("X")
        out = unify(x, "a", {})
        assert out == {x: "a"}

    def test_var_var_aliasing(self):
        x, y = Var("X"), Var("Y")
        sub = unify(x, y, {})
        sub = unify(x, 42, sub)
        from repro.prolog import walk

        assert walk(y, sub) == 42

    def test_struct_recursive(self):
        x = Var("X")
        out = unify(s("f", x, "b"), s("f", "a", "b"), {})
        assert out == {x: "a"}

    def test_struct_functor_mismatch(self):
        assert unify(s("f", "a"), s("g", "a"), {}) is None

    def test_struct_arity_mismatch(self):
        assert unify(s("f", "a"), s("f", "a", "b"), {}) is None

    def test_same_var_both_sides(self):
        x = Var("X")
        assert unify(s("f", x, x), s("f", "a", "b"), {}) is None

    def test_list_roundtrip(self):
        t = from_list([1, 2, 3])
        assert to_list(t, {}) == [1, 2, 3]

    def test_improper_list_raises(self):
        with pytest.raises(ValueError):
            to_list(Struct(".", (1, 2)), {})


# ------------------------------------------------------------ resolution


class TestResolution:
    def test_fact_query(self, eng):
        eng.add_fact(s("edge", "a", "b"))
        assert eng.ask(s("edge", "a", "b"))
        assert not eng.ask(s("edge", "b", "a"))

    def test_variable_query_enumerates(self, eng):
        eng.add_fact(s("edge", "a", "b"))
        eng.add_fact(s("edge", "a", "c"))
        rows = eng.query(s("edge", "a", Var("X")))
        assert [r["X"] for r in rows] == ["b", "c"]

    def test_conjunction(self, eng):
        eng.add_fact(s("edge", "a", "b"))
        eng.add_fact(s("edge", "b", "c"))
        x = Var("X")
        rows = eng.query(s("edge", "a", x), s("edge", x, "c"))
        assert [r["X"] for r in rows] == ["b"]

    def test_rule_chaining(self, eng):
        eng.add_fact(s("parent", "tom", "bob"))
        eng.add_fact(s("parent", "bob", "ann"))
        X, Y, Z = Var("X"), Var("Y"), Var("Z")
        eng.add_rule(s("grand", X, Y), [s("parent", X, Z), s("parent", Z, Y)])
        rows = eng.query(s("grand", Var("A"), Var("B")))
        assert rows == [{"A": "tom", "B": "ann"}]

    def test_recursion_transitive_closure(self, eng):
        for a, b in [("a", "b"), ("b", "c"), ("c", "d")]:
            eng.add_fact(s("edge", a, b))
        X, Y, Z = Var("X"), Var("Y"), Var("Z")
        eng.add_rule(s("path", X, Y), [s("edge", X, Y)])
        eng.add_rule(s("path", X, Y), [s("edge", X, Z), s("path", Z, Y)])
        rows = eng.query(s("path", "a", Var("T")))
        assert sorted(r["T"] for r in rows) == ["b", "c", "d"]

    def test_standardize_apart(self, eng):
        # Two activations of the same clause must not share variables.
        X = Var("X")
        eng.add_rule(s("id", X, X), [])
        rows = eng.query(s("id", "a", Var("A")), s("id", "b", Var("B")))
        assert rows == [{"A": "a", "B": "b"}]

    def test_unknown_predicate_raises(self, eng):
        with pytest.raises(PrologError):
            eng.ask(s("nope", 1))

    def test_step_limit(self):
        eng = Engine(max_steps=1000)
        X, Y, Z = Var("X"), Var("Y"), Var("Z")
        eng.add_fact(s("e", "a", "a"))
        eng.add_rule(s("loop", X), [s("e", X, Z), s("loop", Z)])
        with pytest.raises(StepLimitExceeded):
            list(eng.solve([s("loop", "a")]))

    def test_atom_goal_string(self, eng):
        eng.add_fact(Struct("yes", ()))
        assert eng.ask("yes")


# -------------------------------------------------------------- builtins


class TestBuiltins:
    def test_unify_builtin(self, eng):
        rows = eng.query(s("=", Var("X"), "a"))
        assert rows == [{"X": "a"}]

    def test_not_unify(self, eng):
        assert eng.ask(s("\\=", "a", "b"))
        assert not eng.ask(s("\\=", "a", "a"))

    def test_is_arith(self, eng):
        rows = eng.query(s("is", Var("K"), s("+", 1, s("*", 2, 3))))
        assert rows == [{"K": 7}]

    @pytest.mark.parametrize(
        "expr,expected",
        [
            (s("-", 5, 2), 3),
            (s("-", 5), -5),
            (s("/", 7, 2), 3.5),
            (s("//", 7, 2), 3),
            (s("mod", 7, 2), 1),
            (s("min", 3, 9), 3),
            (s("max", 3, 9), 9),
            (s("abs", -4), 4),
        ],
    )
    def test_arith_ops(self, eng, expr, expected):
        rows = eng.query(s("is", Var("R"), expr))
        assert rows[0]["R"] == expected

    def test_is_unbound_raises(self, eng):
        with pytest.raises(PrologError):
            eng.ask(s("is", Var("X"), s("+", Var("Y"), 1)))

    @pytest.mark.parametrize(
        "op,a,b,holds",
        [
            ("<", 1, 2, True),
            ("<", 2, 2, False),
            (">", 3, 2, True),
            ("=<", 2, 2, True),
            (">=", 1, 2, False),
            ("=:=", 2, 2.0, True),
            ("=\\=", 2, 3, True),
        ],
    )
    def test_comparisons(self, eng, op, a, b, holds):
        assert eng.ask(s(op, a, b)) is holds

    def test_between_generate(self, eng):
        rows = eng.query(s("between", 2, 5, Var("K")))
        assert [r["K"] for r in rows] == [2, 3, 4, 5]

    def test_between_check(self, eng):
        assert eng.ask(s("between", 0, 8, 3))
        assert not eng.ask(s("between", 0, 8, 9))

    def test_member(self, eng):
        rows = eng.query(s("member", Var("X"), from_list(["a", "b"])))
        assert [r["X"] for r in rows] == ["a", "b"]

    def test_member_check(self, eng):
        assert eng.ask(s("member", "b", from_list(["a", "b"])))
        assert not eng.ask(s("member", "z", from_list(["a", "b"])))

    def test_negation_as_failure(self, eng):
        eng.add_fact(s("e", "a"))
        assert eng.ask(s("not", s("e", "b")))
        assert not eng.ask(s("not", s("e", "a")))

    def test_findall_collects_all(self, eng):
        for x in ["a", "b", "c"]:
            eng.add_fact(s("item", x))
        X = Var("X")  # template and goal must share the variable object
        rows = eng.query(s("findall", X, s("item", X), Var("L")))
        assert rows[0]["L"] == ["a", "b", "c"]

    def test_findall_empty(self, eng):
        eng._db.setdefault(("item", 1), [])
        rows = eng.query(s("findall", Var("X"), s("item", Var("X")), Var("L")))
        assert rows[0]["L"] == []

    def test_append_concat(self, eng):
        rows = eng.query(
            s("append", from_list([1, 2]), from_list([3]), Var("L"))
        )
        assert rows[0]["L"] == [1, 2, 3]

    def test_append_split(self, eng):
        rows = eng.query(s("append", Var("A"), Var("B"), from_list([1, 2])))
        assert len(rows) == 3

    def test_length(self, eng):
        rows = eng.query(s("length", from_list(["a", "b", "c"]), Var("N")))
        assert rows[0]["N"] == 3

    def test_sort_dedups_and_orders(self, eng):
        rows = eng.query(s("sort", from_list([3, 1, 2, 1]), Var("L")))
        assert rows[0]["L"] == [1, 2, 3]

    def test_msort_keeps_duplicates(self, eng):
        rows = eng.query(s("msort", from_list([3, 1, 1]), Var("L")))
        assert rows[0]["L"] == [1, 1, 3]

    def test_call_partial_application(self, eng):
        X, Y, R = Var("X"), Var("Y"), Var("R")
        eng.add_rule(s("add", X, Y, R), [s("is", R, s("+", X, Y))])
        rows = eng.query(s("call", s("add", 2), 3, Var("Out")))
        assert rows[0]["Out"] == 5

    def test_foldl_sum(self, eng):
        X, Y, R = Var("X"), Var("Y"), Var("R")
        eng.add_rule(s("sum3", X, Y, R), [s("is", R, s("+", X, Y))])
        rows = eng.query(
            s("foldl", "sum3", from_list([1, 2, 3, 4]), 0, Var("S"))
        )
        assert rows[0]["S"] == 10

    def test_convlist_maps_and_skips(self, eng):
        eng.add_fact(s("property", "cpu", "j1", 10))
        eng.add_fact(s("property", "cpu", "j2", 20))
        # j3 has no cpu property — convlist skips it (SWI semantics).
        rows = eng.query(
            s(
                "convlist",
                s("property", "cpu"),
                from_list(["j1", "j2", "j3"]),
                Var("L"),
            )
        )
        assert rows[0]["L"] == [10, 20]

    def test_ground(self, eng):
        assert eng.ask(s("ground", s("f", 1, "a")))
        assert not eng.ask(s("ground", s("f", Var("X"))))

    def test_true_fail(self, eng):
        assert eng.ask("true")
        assert not eng.ask("fail")

    def test_struct_eq(self, eng):
        assert eng.ask(s("==", s("f", 1), s("f", 1)))
        assert not eng.ask(s("==", s("f", 1), s("f", 2)))
