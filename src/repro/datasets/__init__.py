"""Synthetic dataset generators for the four evaluation graphs of
Table III (all substitutions documented in DESIGN.md):

- ``prov`` — Microsoft provenance graph (raw + summarized),
- ``dblp`` — dblp-net publications graph (raw + summarized),
- ``social`` — soc-livejournal-like power-law network,
- ``roadnet`` — roadnet-usa-like grid road network.
"""
from .prov import prov_raw, prov_summarized
from .dblp import dblp, dblp_summarized
from .social import social
from .roadnet import roadnet

__all__ = [
    "prov_raw",
    "prov_summarized",
    "dblp",
    "dblp_summarized",
    "social",
    "roadnet",
]
