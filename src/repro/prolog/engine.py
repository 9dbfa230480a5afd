"""SLD-resolution engine with negation-as-failure and the built-ins the
Kaskade rule library (Listings 2, 3, 5, 6 of the paper) requires.

Supported built-ins: ``=``, ``\\=``, ``==``, ``is``, arithmetic
comparison (``<``, ``>``, ``=<``, ``>=``, ``=:=``, ``=\\=``),
``between/3``, ``member/2``, ``not/1``, ``findall/3``, ``append/3``,
``length/2``, ``sort/2``, ``msort/2``, ``call/N``, ``foldl/4``,
``convlist/3``, ``ground/1``, ``fail/0``, ``true/0``.

The engine is deliberately small: no cut, no assert/retract, no
occurs-check, depth-first left-to-right search with a global step bound
(so an accidentally non-terminating rule raises instead of hanging the
enumerator).
"""
from __future__ import annotations

from typing import Callable, Iterable, Iterator

from .terms import (
    NIL,
    Struct,
    Subst,
    Term,
    Var,
    from_list,
    is_ground,
    rename,
    resolve,
    s,
    term_key,
    to_list,
    unify,
    walk,
)


class PrologError(Exception):
    """Raised on instantiation errors or malformed goals."""


class StepLimitExceeded(PrologError):
    """Raised when a query exceeds the engine's resolution-step budget."""


Clause = tuple[Struct, tuple[Term, ...]]


def _eval_arith(term: Term, subst: Subst):
    """Evaluate a ground arithmetic expression term to a number."""
    term = walk(term, subst)
    if isinstance(term, (int, float)):
        return term
    if isinstance(term, Var):
        raise PrologError("arguments are not sufficiently instantiated")
    if isinstance(term, Struct):
        f, a = term.functor, [_eval_arith(x, subst) for x in term.args]
        if f == "+" and len(a) == 2:
            return a[0] + a[1]
        if f == "-" and len(a) == 2:
            return a[0] - a[1]
        if f == "-" and len(a) == 1:
            return -a[0]
        if f == "*" and len(a) == 2:
            return a[0] * a[1]
        if f == "/" and len(a) == 2:
            return a[0] / a[1]
        if f == "//" and len(a) == 2:
            return a[0] // a[1]
        if f == "mod" and len(a) == 2:
            return a[0] % a[1]
        if f == "min" and len(a) == 2:
            return min(a)
        if f == "max" and len(a) == 2:
            return max(a)
        if f == "abs" and len(a) == 1:
            return abs(a[0])
    raise PrologError(f"not an arithmetic expression: {term!r}")


class Engine:
    """A tiny Prolog: a clause database plus an SLD resolution loop."""

    def __init__(self, max_steps: int = 2_000_000):
        self._db: dict[tuple[str, int], list[Clause]] = {}
        self.max_steps = max_steps
        self._steps = 0
        self._builtins: dict[tuple[str, int], Callable] = {
            ("=", 2): self._bi_unify,
            ("\\=", 2): self._bi_not_unify,
            ("==", 2): self._bi_struct_eq,
            ("is", 2): self._bi_is,
            ("<", 2): self._bi_cmp(lambda x, y: x < y),
            (">", 2): self._bi_cmp(lambda x, y: x > y),
            ("=<", 2): self._bi_cmp(lambda x, y: x <= y),
            (">=", 2): self._bi_cmp(lambda x, y: x >= y),
            ("=:=", 2): self._bi_cmp(lambda x, y: x == y),
            ("=\\=", 2): self._bi_cmp(lambda x, y: x != y),
            ("between", 3): self._bi_between,
            ("member", 2): self._bi_member,
            ("not", 1): self._bi_not,
            ("\\+", 1): self._bi_not,
            ("findall", 3): self._bi_findall,
            ("append", 3): self._bi_append,
            ("length", 2): self._bi_length,
            ("sort", 2): self._bi_sort,
            ("msort", 2): self._bi_msort,
            ("foldl", 4): self._bi_foldl,
            ("convlist", 3): self._bi_convlist,
            ("ground", 1): self._bi_ground,
            ("true", 0): self._bi_true,
            ("fail", 0): self._bi_fail,
        }

    # -- database -----------------------------------------------------

    def add_fact(self, head: Struct) -> None:
        """Assert a fact (a clause with an empty body)."""
        self.add_rule(head, [])

    def add_rule(self, head: Struct, body: Iterable[Term]) -> None:
        """Assert a rule ``head :- body``. Goals run left to right."""
        if head.indicator in self._builtins:
            raise PrologError(f"cannot redefine builtin {head.indicator}")
        self._db.setdefault(head.indicator, []).append((head, tuple(body)))

    def add_facts(self, facts: Iterable[Struct]) -> None:
        for f in facts:
            self.add_fact(f)

    def add_rules(self, rules: Iterable[tuple[Struct, Iterable[Term]]]) -> None:
        for head, body in rules:
            self.add_rule(head, body)

    def clauses(self, indicator: tuple[str, int]) -> list[Clause]:
        return list(self._db.get(indicator, []))

    # -- public query API ----------------------------------------------

    def solve(self, goals: Iterable[Term], subst: Subst | None = None) -> Iterator[Subst]:
        """Yield one substitution per solution of the conjunction.

        Left-recursive or otherwise non-terminating rules surface as
        :class:`StepLimitExceeded` — either through the engine's own step
        counter or, for deeply right-recursive programs, via Python's
        recursion limit (rewrapped so callers see one exception type).
        """
        self._steps = 0
        it = self._solve(tuple(goals), subst or {})
        while True:
            try:
                val = next(it)
            except StopIteration:
                return
            except RecursionError as e:
                raise StepLimitExceeded(
                    "python recursion limit reached — non-terminating rule?"
                ) from e
            yield val

    def query(self, *goals: Term) -> list[dict[str, Term]]:
        """Solve and return, per solution, a dict of the *named* variables
        appearing in ``goals``, deep-resolved (lists become Python lists)."""
        variables: dict[str, Var] = {}

        def collect(t: Term) -> None:
            if isinstance(t, Var) and not t.name.startswith("_"):
                variables.setdefault(t.name, t)
            elif isinstance(t, Struct):
                for a in t.args:
                    collect(a)

        for g in goals:
            collect(g)
        out = []
        for sub in self.solve(goals):
            row = {}
            for name, v in variables.items():
                val = resolve(v, sub)
                row[name] = self._pythonize(val, sub)
            out.append(row)
        return out

    def ask(self, *goals: Term) -> bool:
        """True iff the conjunction has at least one solution."""
        for _ in self.solve(goals):
            return True
        return False

    @staticmethod
    def _pythonize(term: Term, subst: Subst) -> Term | list:
        if isinstance(term, Struct) and term.functor in (".", "[]"):
            try:
                return [Engine._pythonize(x, subst) for x in to_list(term, subst)]
            except ValueError:
                return term
        return term

    # -- resolution ----------------------------------------------------

    def _solve(self, goals: tuple[Term, ...], subst: Subst) -> Iterator[Subst]:
        if not goals:
            yield subst
            return
        self._steps += 1
        if self._steps > self.max_steps:
            raise StepLimitExceeded(
                f"exceeded {self.max_steps} resolution steps — "
                "non-terminating rule or unbounded generator?"
            )
        goal, rest = walk(goals[0], subst), goals[1:]
        if isinstance(goal, Var):
            raise PrologError("unbound goal")
        if isinstance(goal, str):
            goal = Struct(goal, ())
        if not isinstance(goal, Struct):
            raise PrologError(f"callable expected, got {goal!r}")
        if goal.functor == "call":
            goal = self._expand_call(goal, subst)
        builtin = self._builtins.get(goal.indicator)
        if builtin is not None:
            for s2 in builtin(goal.args, subst):
                yield from self._solve(rest, s2)
            return
        clauses = self._db.get(goal.indicator)
        if clauses is None:
            raise PrologError(f"unknown predicate {goal.indicator}")
        for head, body in clauses:
            mapping: dict[Var, Var] = {}
            h = rename(head, mapping)
            s2 = unify(goal, h, subst)
            if s2 is None:
                continue
            b = tuple(rename(g, mapping) for g in body)
            yield from self._solve(b + rest, s2)

    def _expand_call(self, goal: Struct, subst: Subst) -> Struct:
        """``call(G, Extra...)`` → goal ``G`` with Extra appended."""
        target = walk(goal.args[0], subst)
        extra = goal.args[1:]
        if isinstance(target, str):
            return Struct(target, tuple(extra))
        if isinstance(target, Struct):
            return Struct(target.functor, target.args + tuple(extra))
        raise PrologError(f"call/{len(goal.args)}: not callable: {target!r}")

    # -- builtins --------------------------------------------------------

    def _bi_unify(self, args, subst):
        s2 = unify(args[0], args[1], subst)
        if s2 is not None:
            yield s2

    def _bi_not_unify(self, args, subst):
        if unify(args[0], args[1], subst) is None:
            yield subst

    def _bi_struct_eq(self, args, subst):
        if resolve(args[0], subst) == resolve(args[1], subst):
            yield subst

    def _bi_is(self, args, subst):
        val = _eval_arith(args[1], subst)
        s2 = unify(args[0], val, subst)
        if s2 is not None:
            yield s2

    def _bi_cmp(self, op):
        def impl(args, subst):
            if op(_eval_arith(args[0], subst), _eval_arith(args[1], subst)):
                yield subst

        return impl

    def _bi_between(self, args, subst):
        lo = _eval_arith(args[0], subst)
        hi = _eval_arith(args[1], subst)
        if not (isinstance(lo, int) and isinstance(hi, int)):
            raise PrologError("between/3: bounds must be integers")
        x = walk(args[2], subst)
        if isinstance(x, int):
            if lo <= x <= hi:
                yield subst
            return
        for k in range(lo, hi + 1):
            s2 = unify(args[2], k, subst)
            if s2 is not None:
                yield s2

    def _bi_member(self, args, subst):
        try:
            items = to_list(args[1], subst)
        except ValueError as e:
            raise PrologError(f"member/2: {e}") from e
        for item in items:
            s2 = unify(args[0], item, subst)
            if s2 is not None:
                yield s2

    def _bi_not(self, args, subst):
        goal = args[0]
        for _ in self._solve((goal,), subst):
            return
        yield subst

    def _bi_findall(self, args, subst):
        template, goal, out = args
        results = [resolve(template, s2) for s2 in self._solve((goal,), subst)]
        s2 = unify(out, from_list(results), subst)
        if s2 is not None:
            yield s2

    def _bi_append(self, args, subst):
        a, b, c = args
        try:
            xs = to_list(a, subst)
            s2 = unify(c, from_list(xs + to_list(b, subst)), subst)
            if s2 is not None:
                yield s2
            return
        except ValueError:
            pass
        # Generative mode: split a ground third argument.
        try:
            zs = to_list(c, subst)
        except ValueError as e:
            raise PrologError(f"append/3: insufficiently instantiated ({e})") from e
        for i in range(len(zs) + 1):
            s2 = unify(a, from_list(zs[:i]), subst)
            if s2 is None:
                continue
            s3 = unify(b, from_list(zs[i:]), s2)
            if s3 is not None:
                yield s3

    def _bi_length(self, args, subst):
        items = to_list(args[0], subst)
        s2 = unify(args[1], len(items), subst)
        if s2 is not None:
            yield s2

    def _bi_sort(self, args, subst):
        items = [resolve(x, subst) for x in to_list(args[0], subst)]
        uniq = sorted(set(items), key=term_key) if all(
            not isinstance(i, Struct) for i in items
        ) else self._dedup_sorted(items)
        s2 = unify(args[1], from_list(uniq), subst)
        if s2 is not None:
            yield s2

    @staticmethod
    def _dedup_sorted(items):
        out = []
        for it in sorted(items, key=term_key):
            if not out or out[-1] != it:
                out.append(it)
        return out

    def _bi_msort(self, args, subst):
        items = [resolve(x, subst) for x in to_list(args[0], subst)]
        s2 = unify(args[1], from_list(sorted(items, key=term_key)), subst)
        if s2 is not None:
            yield s2

    def _bi_foldl(self, args, subst):
        goal, lst, v0, v = args
        items = to_list(lst, subst)
        acc: Term = v0

        def go(i: int, sub: Subst) -> Iterator[Subst]:
            nonlocal acc
            if i == len(items):
                s2 = unify(v, acc, sub)
                if s2 is not None:
                    yield s2
                return
            out_var = Var("_Acc")
            call_goal = s("call", goal, items[i], acc, out_var)
            for s2 in self._solve((call_goal,), sub):
                saved = acc
                acc = resolve(out_var, s2)
                yield from go(i + 1, s2)
                acc = saved

        yield from go(0, subst)

    def _bi_convlist(self, args, subst):
        goal, lst, out = args
        results = []
        for item in to_list(lst, subst):
            y = Var("_Y")
            for s2 in self._solve((s("call", goal, item, y),), subst):
                results.append(resolve(y, s2))
                break  # first solution only, as SWI's convlist/3
        s2 = unify(out, from_list(results), subst)
        if s2 is not None:
            yield s2

    def _bi_ground(self, args, subst):
        if is_ground(args[0], subst):
            yield subst

    def _bi_true(self, args, subst):
        yield subst

    def _bi_fail(self, args, subst):
        return
        yield  # pragma: no cover
