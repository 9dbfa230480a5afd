"""Term representation for the mini-Prolog inference engine.

Kaskade (§ IV) runs its view enumeration on SWI-Prolog. That substrate
is not available offline, so we implement the subset of Prolog the
paper's listings (Lst. 2, 3, 5, 6) actually use. Terms are:

- **Variables** — :class:`Var`, identity-based (two ``Var("X")`` objects
  are *different* variables; rules are standardized apart by allocating
  fresh ``Var`` objects per clause activation).
- **Atoms / numbers** — plain Python ``str`` / ``int`` / ``float``.
- **Compound terms** — :class:`Struct` with a functor and arg tuple.
- **Lists** — cons cells ``Struct(".", (head, tail))`` terminated by
  ``NIL``; :func:`from_list` / :func:`to_list` convert to/from Python.

Substitutions are immutable-by-convention ``dict[Var, Term]`` maps;
:func:`unify` copies on bind, which is cheap at the scale of view
enumeration (tens of facts, not millions).
"""
from __future__ import annotations

from dataclasses import dataclass
from typing import Iterable, Union

Term = Union["Var", "Struct", str, int, float]
Subst = dict["Var", Term]


class Var:
    """A logic variable. Identity equality; ``name`` is for display only."""

    __slots__ = ("name",)

    def __init__(self, name: str = "_"):
        self.name = name

    def __repr__(self) -> str:  # pragma: no cover - debug aid
        return f"_{self.name}@{id(self) & 0xFFFF:04x}"


@dataclass(frozen=True)
class Struct:
    """A compound term ``functor(args...)``. Atoms are plain strings."""

    functor: str
    args: tuple = ()

    @property
    def indicator(self) -> tuple[str, int]:
        """The predicate indicator ``(name, arity)``."""
        return (self.functor, len(self.args))

    def __repr__(self) -> str:  # pragma: no cover - debug aid
        if not self.args:
            return self.functor
        return f"{self.functor}({', '.join(map(repr, self.args))})"


NIL = Struct("[]", ())
CONS = "."


def s(functor: str, *args: Term) -> Struct:
    """Shorthand constructor: ``s("edge", X, Y)`` == ``edge(X, Y)``."""
    return Struct(functor, tuple(args))


def from_list(items: Iterable[Term]) -> Term:
    """Build a proper Prolog list term from a Python iterable."""
    out: Term = NIL
    for item in reversed(list(items)):
        out = Struct(CONS, (item, out))
    return out


def to_list(term: Term, subst: Subst) -> list[Term]:
    """Convert a proper (ground-spined) list term to a Python list.

    Raises ``ValueError`` on improper lists or unbound tails, which in
    our rule library indicates a bug in a rule, not a user error.
    """
    out: list[Term] = []
    t = walk(term, subst)
    while True:
        if t == NIL:
            return out
        if isinstance(t, Struct) and t.functor == CONS and len(t.args) == 2:
            out.append(walk(t.args[0], subst))
            t = walk(t.args[1], subst)
            continue
        raise ValueError(f"not a proper list: {t!r}")


def walk(term: Term, subst: Subst) -> Term:
    """Follow variable bindings until a non-variable or free variable."""
    while isinstance(term, Var):
        bound = subst.get(term)
        if bound is None:
            return term
        term = bound
    return term


def resolve(term: Term, subst: Subst) -> Term:
    """Deep-walk: substitute bindings recursively throughout ``term``."""
    term = walk(term, subst)
    if isinstance(term, Struct) and term.args:
        return Struct(term.functor, tuple(resolve(a, subst) for a in term.args))
    return term


def unify(a: Term, b: Term, subst: Subst) -> Subst | None:
    """Unify two terms; return an extended substitution or ``None``.

    No occurs-check (as in standard Prolog); the rule library never
    builds cyclic terms.
    """
    a, b = walk(a, subst), walk(b, subst)
    if a is b:
        return subst
    if isinstance(a, Var):
        out = dict(subst)
        out[a] = b
        return out
    if isinstance(b, Var):
        out = dict(subst)
        out[b] = a
        return out
    if isinstance(a, Struct) and isinstance(b, Struct):
        if a.functor != b.functor or len(a.args) != len(b.args):
            return None
        for x, y in zip(a.args, b.args):
            nxt = unify(x, y, subst)
            if nxt is None:
                return None
            subst = nxt
        return subst
    # Atoms / numbers: Python equality, but never conflate 1 and 1.0
    # with "1" (bool is an int subclass we do not use).
    if type(a) is type(b) and a == b:
        return subst
    if isinstance(a, (int, float)) and isinstance(b, (int, float)) and a == b:
        return subst
    return None


def rename(term: Term, mapping: dict[Var, Var]) -> Term:
    """Standardize apart: copy ``term`` with fresh variables."""
    if isinstance(term, Var):
        fresh = mapping.get(term)
        if fresh is None:
            fresh = Var(term.name)
            mapping[term] = fresh
        return fresh
    if isinstance(term, Struct) and term.args:
        return Struct(term.functor, tuple(rename(a, mapping) for a in term.args))
    return term


def is_ground(term: Term, subst: Subst) -> bool:
    """True iff ``term`` contains no unbound variables under ``subst``."""
    term = walk(term, subst)
    if isinstance(term, Var):
        return False
    if isinstance(term, Struct):
        return all(is_ground(a, subst) for a in term.args)
    return True


def term_key(term: Term):
    """A total-order sort key over ground terms (Prolog standard order:
    numbers < atoms < compound by arity, then functor, then args)."""
    if isinstance(term, (int, float)):
        return (0, float(term), 0 if isinstance(term, int) else 1)
    if isinstance(term, str):
        return (1, term)
    if isinstance(term, Struct):
        return (2, len(term.args), term.functor, tuple(term_key(a) for a in term.args))
    raise ValueError(f"cannot order non-ground term {term!r}")
