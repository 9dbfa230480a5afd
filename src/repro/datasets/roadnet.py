"""Synthetic road network — substitute for roadnet-usa (network
repository; DESIGN.md § Substitutions).

Fig. 5 / Fig. 7 use this dataset as the *homogeneous non-power-law*
case: near-constant degree (≤ 4), no hubs, long paths dominate, and the
median-degree (α=50) estimator approximates an upper bound on 2-hop
connector size. A perturbed grid graph (4-neighborhood, both
directions, a fraction of edges removed) has exactly that degree
profile.
"""
from __future__ import annotations

import numpy as np
import pandas as pd
from pyspark.sql import SparkSession

from ..core.schema import HOMOGENEOUS
from ..engine.property_graph import PropertyGraph, graph_from_pandas

SCHEMA = HOMOGENEOUS


def roadnet(
    spark: SparkSession,
    *,
    scale: float = 1.0,
    seed: int = 17,
    rows: int = 100,
    cols: int = 100,
    drop_frac: float = 0.1,
) -> PropertyGraph:
    """Grid road network: vertices at (r, c); directed edges both ways
    between 4-neighbors; ``drop_frac`` of edges removed at random
    (road closures / irregular topology)."""
    g = np.random.default_rng(seed)
    R = max(3, int(rows * np.sqrt(scale)))
    C = max(3, int(cols * np.sqrt(scale)))
    n = R * C
    ids = np.arange(n, dtype=np.int64)
    right_src = ids[(ids % C) < (C - 1)]
    right_dst = right_src + 1
    down_src = ids[ids < (R - 1) * C]
    down_dst = down_src + C
    und_src = np.concatenate([right_src, down_src])
    und_dst = np.concatenate([right_dst, down_dst])
    keep = g.random(len(und_src)) >= drop_frac
    und_src, und_dst = und_src[keep], und_dst[keep]
    src = np.concatenate([und_src, und_dst])
    dst = np.concatenate([und_dst, und_src])
    vertices = pd.DataFrame({"id": ids, "vtype": "Vertex"})
    edges = pd.DataFrame(
        {
            "src": src,
            "dst": dst,
            "etype": "LINK",
            "ts": g.integers(0, 10_000, len(src)),
        }
    )
    return graph_from_pandas(spark, vertices, edges, name="roadnet")
