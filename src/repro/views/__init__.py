"""Materialization of graph views (connectors + summarizers, § VI) and
the graph analytics the workload runs over them (label propagation).
"""
from .connectors import (
    khop_connector,
    materialize,
    same_edge_type_connector,
    same_vertex_type_connector,
    source_to_sink_connector,
    upto_khop_connector,
)
from .summarizers import (
    edge_aggregator,
    edge_inclusion,
    edge_removal,
    keep_vertex_types,
    subgraph_aggregator,
    vertex_aggregator,
    vertex_inclusion,
    vertex_removal,
)
from .algorithms import (
    community_sizes,
    label_propagation,
    label_propagation_reference,
    largest_community,
    undirected_neighbors,
)

__all__ = [
    "khop_connector",
    "upto_khop_connector",
    "same_vertex_type_connector",
    "same_edge_type_connector",
    "source_to_sink_connector",
    "materialize",
    "vertex_inclusion",
    "vertex_removal",
    "keep_vertex_types",
    "edge_inclusion",
    "edge_removal",
    "vertex_aggregator",
    "edge_aggregator",
    "subgraph_aggregator",
    "label_propagation",
    "label_propagation_reference",
    "community_sizes",
    "largest_community",
    "undirected_neighbors",
]
