"""ER problem similarity graph (paper §4.3) and its clustering.

Vertices are ER problems, edge weights are the aggregated distribution
similarities ``sim_p``. The graph is complete by construction (every
problem pair is compared); to give modularity contrast we optionally
drop edges below a similarity threshold — with ``prune="median"`` the
per-graph median weight, the default, which keeps well-matched problem
pairs connected while letting Leiden split weakly related ones (the
paper's stated goal of avoiding one big connected component).
"""
from __future__ import annotations

import numpy as np

from repro.core.distribution import ProblemSummary, problem_similarity
from repro.graphcluster import Graph, label_propagation, leiden


def build_problem_graph(
    summaries: dict[str, ProblemSummary],
    test: str = "ks",
    prune: str | float | None = "median",
) -> Graph:
    """Complete weighted graph over ``summaries``, then pruned.

    ``prune``: ``None`` keeps all edges; a float drops edges with
    weight strictly below it; ``"median"`` uses the median weight.
    Every problem stays a vertex even if all its edges are pruned.
    """
    ids = sorted(summaries)
    g = Graph()
    for p in ids:
        g.add_node(p)
    weights = []
    edges = []
    for i, p in enumerate(ids):
        for q in ids[i + 1 :]:
            w = problem_similarity(summaries[p], summaries[q], test)
            edges.append((p, q, w))
            weights.append(w)
    thr = _threshold(prune, weights)
    for p, q, w in edges:
        if w >= thr:
            g.add_edge(p, q, w)
    return g


def _threshold(prune: str | float | None, weights: list[float]) -> float:
    if prune is None or not weights:
        return -np.inf
    if prune == "median":
        return float(np.median(weights))
    return float(prune)


def insert_problem(
    g: Graph,
    summaries: dict[str, ProblemSummary],
    new: ProblemSummary,
    test: str = "ks",
    prune: str | float | None = "median",
) -> None:
    """Incrementally add one ER problem to the graph (sel_cov, §4.5).

    Edges from the new vertex to every existing vertex are computed and
    pruned with the same rule used at construction time (threshold
    re-derived from the existing edge weights plus the new ones).
    """
    existing = [w for _, _, w in g.edges()]
    g.add_node(new.problem_id)
    new_edges = []
    for p in list(summaries):
        if p == new.problem_id:
            continue
        w = problem_similarity(summaries[p], new, test)
        new_edges.append((p, w))
    thr = _threshold(prune, existing + [w for _, w in new_edges])
    for p, w in new_edges:
        if w >= thr:
            g.add_edge(new.problem_id, p, w)
    summaries[new.problem_id] = new


def cluster_problems(
    g: Graph, algorithm: str = "leiden", seed: int = 0, resolution: float = 1.0
) -> dict[str, int]:
    """Partition the problem graph; returns problem_id -> cluster id."""
    if algorithm == "leiden":
        return leiden(g, resolution=resolution, seed=seed)
    if algorithm == "label_prop":
        return label_propagation(g, seed=seed)
    raise ValueError(f"unknown clustering algorithm: {algorithm!r}")
