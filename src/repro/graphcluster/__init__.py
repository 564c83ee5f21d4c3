"""Driver-side graph substrate.

The ER *problem* graph has one vertex per ER problem (≤ a few hundred),
so clustering it is driver-side work by design — the paper's own
pipeline runs Leiden on this small graph while the per-pair data stays
in the dataflow layer. Provides a weighted undirected graph, union-find
connected components, the Leiden algorithm, and label propagation as
the alternative clustering the paper mentions (§4.3).
"""
from repro.graphcluster.graph import Graph, UnionFind, connected_components
from repro.graphcluster.label_prop import label_propagation
from repro.graphcluster.leiden import leiden, modularity

__all__ = [
    "Graph",
    "UnionFind",
    "connected_components",
    "leiden",
    "modularity",
    "label_propagation",
]
