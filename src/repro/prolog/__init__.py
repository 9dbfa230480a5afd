"""Miniature Prolog-style inference engine.

Kaskade (§ IV) performs *inference-based view enumeration* on SWI-Prolog.
This package is our offline substitute: unification, SLD resolution with
negation-as-failure, and the built-ins used by the paper's constraint
mining rules and view templates (``findall``, ``between``, ``member``,
arithmetic, ``foldl``, ``convlist``). See ``DESIGN.md`` § Substitutions.
"""
from .engine import Engine, PrologError, StepLimitExceeded
from .terms import (
    NIL,
    Struct,
    Var,
    from_list,
    is_ground,
    resolve,
    s,
    to_list,
    unify,
    walk,
)

__all__ = [
    "Engine",
    "PrologError",
    "StepLimitExceeded",
    "NIL",
    "Struct",
    "Var",
    "from_list",
    "is_ground",
    "resolve",
    "s",
    "to_list",
    "unify",
    "walk",
]
