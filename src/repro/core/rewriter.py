"""View-based query rewriting (§ V-C).

Given a query pattern and a (candidate or materialized) k-hop connector
view, produce the equivalent rewritten pattern over the view: the
traversal core ``src ⇝ dst`` with feasible hop counts ``K`` becomes a
variable-length path over connector edges with bounds ``K/k``.

A connector view admits an *equivalence-preserving* single-view
rewriting iff (Lst. 1 → Lst. 4 in the paper):

1. the query projects exactly the connector's anchor vertices,
2. every schema-feasible end-to-end hop count ``K`` of the query is a
   multiple of the connector's ``k`` (otherwise paths are lost), and
3. the resulting connector hop counts form a contiguous range
   (Cypher's ``*lo..hi`` cannot express gaps).

Note: the paper's Listing 4 uses ``*1..4`` for the running example;
hop arithmetic gives ``*1..5`` (K ∈ {2,…,10}), which is what condition 3
produces here — see DESIGN.md § Known deviations.
"""
from __future__ import annotations

from dataclasses import dataclass

from ..prolog import Var, s
from .enumerator import ConnectorCandidate, ViewEnumerator
from .pattern import PatternVertex, QueryPattern, VarLengthPath
from .schema import GraphSchema


@dataclass(frozen=True)
class Rewriting:
    """A query rewritten over a single connector view."""

    view: ConnectorCandidate
    original: QueryPattern
    rewritten: QueryPattern
    lower: int  # connector-hop bounds
    upper: int


def feasible_hop_counts(
    pattern: QueryPattern, schema: GraphSchema, src_var: str, dst_var: str
) -> list[int]:
    """Schema-feasible end-to-end hop counts between two query vertices:
    ``queryKHopPath`` values filtered by ``schemaKHopPath`` feasibility
    of the endpoint types (both rules from § IV)."""
    eng = ViewEnumerator(schema).engine_for(pattern)
    K = Var("K")
    ks = sorted({r["K"] for r in eng.query(s("queryKHopPath", src_var, dst_var, K))})
    st, dt = pattern.vtype(src_var), pattern.vtype(dst_var)
    out = []
    for k in ks:
        if k == 0:
            continue  # zero-length: endpoints coincide, no edge traversed
        if st is None or dt is None or eng.ask(s("schemaKHopPath", st, dt, k)):
            out.append(k)
    return out


def rewrite_with_connector(
    pattern: QueryPattern, view: ConnectorCandidate, schema: GraphSchema
) -> Rewriting | None:
    """Rewrite ``pattern`` over ``view`` if equivalence-preserving
    (conditions in the module docstring); else ``None``."""
    projected = [var for var, _ in pattern.returns]
    if sorted(projected) != sorted({view.src_var, view.dst_var}):
        return None
    ks = feasible_hop_counts(pattern, schema, view.src_var, view.dst_var)
    if not ks:
        return None
    if any(k % view.k != 0 for k in ks):
        return None
    hops = sorted(k // view.k for k in ks)
    if hops != list(range(hops[0], hops[-1] + 1)):
        return None  # gapped ranges are inexpressible as *lo..hi
    alias = dict(pattern.returns)
    rewritten = QueryPattern(
        vertices=(
            PatternVertex(view.src_var, view.src_type),
            PatternVertex(view.dst_var, view.dst_type),
        ),
        edges=(),
        paths=(
            VarLengthPath(
                view.src_var, view.dst_var, hops[0], hops[-1], view.edge_type
            ),
        ),
        returns=(
            (view.src_var, alias[view.src_var]),
            (view.dst_var, alias[view.dst_var]),
        ),
    )
    return Rewriting(
        view=view, original=pattern, rewritten=rewritten,
        lower=hops[0], upper=hops[-1],
    )


def best_rewriting(
    pattern: QueryPattern,
    materialized: list[ConnectorCandidate],
    schema: GraphSchema,
    cost_of,
) -> Rewriting | None:
    """§ V-C: among materialized views applicable to ``pattern``, pick
    the rewriting with the smallest estimated evaluation cost
    (``cost_of(rewriting) -> float``). ``None`` if no view applies."""
    best: tuple[float, Rewriting] | None = None
    for view in materialized:
        rw = rewrite_with_connector(pattern, view, schema)
        if rw is None:
            continue
        c = cost_of(rw)
        if best is None or c < best[0]:
            best = (c, rw)
    return best[1] if best else None
