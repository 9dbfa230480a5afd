"""Synthetic dblp-net — substitute for the GraphDBLP dump of § VII-B
(authors, publications of three types, venues; DESIGN.md
§ Substitutions).

What the experiments need from it:

- heterogeneity: venue vertices (and PUBLISHED_IN edges) are what the
  summarizer strips for co-authorship queries;
- a power-law authorship degree (prolific authors) so the
  author-to-author 2-hop connector dedups heavily (repeat collaborator
  pairs), giving the ~1 order-of-magnitude connector reduction of
  Fig. 6;
- both directions of authorship (WROTE / WRITTEN_BY) so
  author–publication–author is a directed 2-hop path, exactly like
  job–file–job in prov.

Vertex-id ranges: authors < 1e6 ≤ publications < 2e6 ≤ venues.
"""
from __future__ import annotations

import numpy as np
import pandas as pd
from pyspark.sql import SparkSession

from ..core.schema import DBLP_CORE, DBLP_FULL
from ..engine.property_graph import PropertyGraph, graph_from_pandas

SCHEMA_RAW = DBLP_FULL
SCHEMA_SUMMARIZED = DBLP_CORE

PUB_BASE = 1_000_000
VENUE_BASE = 2_000_000

PUB_TYPES = ("Article", "Inproc", "Publication")


def dblp(
    spark: SparkSession,
    *,
    scale: float = 1.0,
    seed: int = 11,
    authors: int = 3_000,
    papers_per_author: float = 8.0,
    venues: int = 60,
    community_size: int = 6,
    zipf_exponent: float = 1.6,
) -> PropertyGraph:
    """Generate the raw dblp graph.

    Authors are grouped into collaboration communities of
    ``community_size``; a paper's authors are drawn from one community
    (with a zipf-weighted 'lead author' preference), which yields both
    the power-law authorship degree and repeat collaborations.
    """
    g = np.random.default_rng(seed)
    A = max(4, int(authors * scale))
    n_papers = int(A * papers_per_author)
    pub_ids = PUB_BASE + np.arange(n_papers, dtype=np.int64)
    venue_ids = VENUE_BASE + np.arange(venues, dtype=np.int64)
    pub_type = np.array(PUB_TYPES)[g.integers(0, 3, n_papers)]
    pub_venue = venue_ids[g.integers(0, venues, n_papers)]

    # Authorship: per paper, 1-6 authors from one small community. Small
    # repeat-collaborator communities are what make the author-to-author
    # connector contract heavily (many co-authored papers per pair →
    # one connector edge), the § VII-E dblp reduction.
    n_auth = 1 + np.minimum(5, g.zipf(1.5, n_papers))
    n_comm = max(1, A // community_size)
    paper_comm = g.integers(0, n_comm, n_papers)
    total = int(n_auth.sum())
    paper_rep = np.repeat(np.arange(n_papers), n_auth)
    comm_rep = np.repeat(paper_comm, n_auth)
    # zipf rank within community: prolific authors are low ranks
    u = g.random(total)
    rank = np.floor(
        community_size * u ** zipf_exponent
    ).astype(np.int64)
    author_idx = (comm_rep * community_size + rank) % A
    authorship = pd.DataFrame(
        {"paper": paper_rep, "author": author_idx}
    ).drop_duplicates()
    a = authorship["author"].to_numpy(dtype=np.int64)
    p = pub_ids[authorship["paper"].to_numpy()]
    year = 1980 + (authorship["paper"].to_numpy() % 40)

    # Authors carry a CPU-like cost property (Q1 aggregates it — on dblp
    # it stands in for any per-author numeric metric) and their
    # community as pname (Q1's group-by key, like prov's pipeline).
    author_comm = np.arange(A) // community_size
    author_cost = np.round(np.exp(g.normal(1.0, 0.8, A)), 2)
    vertices = pd.DataFrame(
        {
            "id": np.concatenate([np.arange(A, dtype=np.int64), pub_ids, venue_ids]),
            "vtype": ["Author"] * A + list(pub_type) + ["Venue"] * venues,
            "cpu": np.concatenate(
                [author_cost, np.full(n_papers + venues, np.nan)]
            ),
            "pname": (
                [f"comm_{c}" for c in author_comm]
                + [None] * n_papers
                + [f"venue_{i}" for i in range(venues)]
            ),
        }
    )
    edges = pd.concat(
        [
            pd.DataFrame({"src": a, "dst": p, "etype": "WROTE", "ts": year}),
            pd.DataFrame({"src": p, "dst": a, "etype": "WRITTEN_BY", "ts": year}),
            pd.DataFrame(
                {"src": pub_ids, "dst": pub_venue, "etype": "PUBLISHED_IN",
                 "ts": 1980 + (np.arange(n_papers) % 40)}
            ),
        ],
        ignore_index=True,
    )
    return graph_from_pandas(spark, vertices, edges, name="dblp_raw")


def dblp_summarized(spark: SparkSession, **kwargs) -> PropertyGraph:
    """Summarized dblp (§ VII-B): authors + the three publication types
    only — the vertex-inclusion summarizer applied to the raw graph."""
    from ..views.summarizers import keep_vertex_types

    raw = dblp(spark, **kwargs)
    out = keep_vertex_types(raw, {"Author", *PUB_TYPES})
    return PropertyGraph(out.vertices, out.edges, name="dblp")
