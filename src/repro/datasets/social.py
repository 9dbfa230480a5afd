"""Synthetic power-law social network — substitute for soc-LiveJournal1
(SNAP; DESIGN.md § Substitutions).

Fig. 5 / Fig. 7 use this dataset as the *homogeneous power-law* case:
2-hop connectors blow up past the raw size, the α=95 estimator
upper-bounds the path count while α=50 lower-bounds it, and query
runtime over the connector tracks its (larger) size. A directed
Chung–Lu model with a power-law expected-degree sequence reproduces
those properties.
"""
from __future__ import annotations

import numpy as np
import pandas as pd
from pyspark.sql import SparkSession

from ..core.schema import HOMOGENEOUS
from ..engine.property_graph import PropertyGraph, graph_from_pandas

SCHEMA = HOMOGENEOUS


def social(
    spark: SparkSession,
    *,
    scale: float = 1.0,
    seed: int = 13,
    vertices: int = 10_000,
    base_out_degree: int = 2,
    out_zipf: float = 1.6,
    gamma: float = 2.3,
    max_degree_frac: float = 0.02,
) -> PropertyGraph:
    """Directed power-law graph. Every vertex gets an out-degree of
    ``base_out_degree + zipf(out_zipf)`` (so the *median* out-degree is
    positive, like the real network — the α=50 estimator would be
    trivially 0 otherwise), capped at ``max_degree_frac·n``; edge
    destinations are drawn ∝ a power-law popularity sequence
    ``w_i ∝ (i+1)^(-1/(γ-1))`` (Chung–Lu style), giving the heavy
    in-degree tail of Fig. 8."""
    g = np.random.default_rng(seed)
    n = max(10, int(vertices * scale))
    cap = max(base_out_degree + 1, int(n * max_degree_frac))
    out_deg = np.minimum(cap, base_out_degree + g.zipf(out_zipf, n))
    src = np.repeat(np.arange(n, dtype=np.int64), out_deg)
    w = (np.arange(1, n + 1, dtype=np.float64)) ** (-1.0 / (gamma - 1.0))
    p = w / w.sum()
    dst = g.choice(n, size=len(src), p=p)
    keep = src != dst
    edges = pd.DataFrame({"src": src[keep], "dst": dst[keep]}).drop_duplicates()
    vertices_pdf = pd.DataFrame(
        {"id": np.arange(n, dtype=np.int64), "vtype": "Vertex"}
    )
    e = pd.DataFrame(
        {
            "src": edges["src"].to_numpy(dtype=np.int64),
            "dst": edges["dst"].to_numpy(dtype=np.int64),
            "etype": "LINK",
            "ts": g.integers(0, 10_000, len(edges)),
        }
    )
    return graph_from_pandas(spark, vertices_pdf, e, name="soc")
