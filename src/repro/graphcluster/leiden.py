"""Leiden community detection (Traag, Waltman & van Eck, 2019).

From-scratch implementation of the three Leiden phases — fast local
moving, refinement inside communities, graph aggregation — repeated
until the partition is stable. Optimises weighted modularity

    Q = sum_c ( e_c / m  -  gamma * (d_c / (2 m))^2 )

where ``e_c`` is the intra-community edge weight (each edge once),
``d_c`` the summed weighted degree of the community and ``m`` the total
edge weight. Deterministic for a fixed ``seed``.

The refinement phase is what distinguishes Leiden from Louvain: nodes
are re-partitioned *within* each local-move community before
aggregation, which prevents the badly-connected communities Louvain can
produce — the property the paper cites for choosing Leiden (§4.3). The
next level's local move is seeded with the parent partition, as in the
original algorithm, so aggregation can never lose modularity.
"""
from __future__ import annotations

from collections.abc import Hashable

import numpy as np

from repro.graphcluster.graph import Graph


def modularity(
    g: Graph, partition: dict[Hashable, int], resolution: float = 1.0
) -> float:
    """Weighted modularity of ``partition`` (community id per node)."""
    m = g.total_weight
    if m <= 0:
        return 0.0
    e: dict[int, float] = {}
    d: dict[int, float] = {}
    for u in g.nodes:
        d[partition[u]] = d.get(partition[u], 0.0) + g.degree(u)
    for u, v, w in g.edges():
        if partition[u] == partition[v]:
            e[partition[u]] = e.get(partition[u], 0.0) + w
    q = 0.0
    for c, dc in d.items():
        q += e.get(c, 0.0) / m - resolution * (dc / (2 * m)) ** 2
    return q


def _local_move(
    g: Graph,
    comm: dict[Hashable, int],
    resolution: float,
    rng: np.random.Generator,
) -> bool:
    """Queue-driven local moving; mutates ``comm``. Returns True if any move.

    Each executed move strictly increases modularity, so the queue
    drains in finite time.
    """
    m = g.total_weight
    if m <= 0:
        return False
    degree = {u: g.degree(u) for u in g.nodes}
    comm_tot: dict[int, float] = {}
    for u in g.nodes:
        comm_tot[comm[u]] = comm_tot.get(comm[u], 0.0) + degree[u]

    nodes = list(g.nodes)
    rng.shuffle(nodes)
    queue = list(nodes)
    in_queue = set(queue)
    moved_any = False
    while queue:
        u = queue.pop(0)
        in_queue.discard(u)
        cu = comm[u]
        ku = degree[u]
        comm_tot[cu] -= ku  # evaluate gains with u taken out
        k_uc: dict[int, float] = {cu: 0.0}
        for v, w in g.neighbors(u).items():
            if v == u:
                continue
            k_uc[comm[v]] = k_uc.get(comm[v], 0.0) + w
        best_c = cu
        best_gain = k_uc[cu] - resolution * ku * comm_tot.get(cu, 0.0) / (2 * m)
        for c, kc in k_uc.items():
            gain = kc - resolution * ku * comm_tot.get(c, 0.0) / (2 * m)
            if gain > best_gain + 1e-12:
                best_c, best_gain = c, gain
        comm[u] = best_c
        comm_tot[best_c] = comm_tot.get(best_c, 0.0) + ku
        if best_c != cu:
            moved_any = True
            for v in g.neighbors(u):
                if v != u and comm[v] != best_c and v not in in_queue:
                    queue.append(v)
                    in_queue.add(v)
    return moved_any


def _refine(
    g: Graph,
    comm: dict[Hashable, int],
    resolution: float,
    rng: np.random.Generator,
) -> dict[Hashable, int]:
    """Refinement: singleton start, merges only inside local-move communities.

    Only nodes still alone in their refined community may move (the
    Leiden constraint), so the pass performs at most n merges.
    """
    m = g.total_weight
    refined = {u: i for i, u in enumerate(g.nodes)}
    if m <= 0:
        return refined
    degree = {u: g.degree(u) for u in g.nodes}
    ref_tot: dict[int, float] = {refined[u]: degree[u] for u in g.nodes}
    ref_size: dict[int, int] = {refined[u]: 1 for u in g.nodes}

    nodes = list(g.nodes)
    rng.shuffle(nodes)
    for u in nodes:
        ru = refined[u]
        if ref_size[ru] > 1:
            continue
        ku = degree[u]
        ref_tot[ru] -= ku
        k_ur: dict[int, float] = {}
        for v, w in g.neighbors(u).items():
            if v == u or comm[v] != comm[u]:
                continue
            k_ur[refined[v]] = k_ur.get(refined[v], 0.0) + w
        best_r, best_gain = ru, 0.0
        for r, kr in k_ur.items():
            gain = kr - resolution * ku * ref_tot.get(r, 0.0) / (2 * m)
            if gain > best_gain + 1e-12:
                best_r, best_gain = r, gain
        refined[u] = best_r
        ref_tot[best_r] = ref_tot.get(best_r, 0.0) + ku
        if best_r != ru:
            ref_size[ru] -= 1
            ref_size[best_r] += 1
    return refined


def _aggregate(g: Graph, refined: dict[Hashable, int]) -> Graph:
    """Collapse refined communities into super-nodes (weights summed)."""
    agg = Graph()
    for r in set(refined.values()):
        agg.add_node(r)
    acc: dict[tuple[int, int], float] = {}
    for u, v, w in g.edges():
        a, b = refined[u], refined[v]
        key = (a, b) if a <= b else (b, a)
        acc[key] = acc.get(key, 0.0) + w
    for (a, b), w in acc.items():
        agg.add_edge(a, b, w)
    return agg


def _densify(g: Graph, partition: dict[Hashable, int]) -> dict[Hashable, int]:
    remap: dict[int, int] = {}
    out: dict[Hashable, int] = {}
    for u in g.nodes:
        c = partition[u]
        if c not in remap:
            remap[c] = len(remap)
        out[u] = remap[c]
    return out


def leiden(
    g: Graph,
    resolution: float = 1.0,
    seed: int = 0,
    max_levels: int = 20,
) -> dict[Hashable, int]:
    """Cluster ``g``; returns node -> dense community id (0..k-1)."""
    if g.number_of_nodes() == 0:
        return {}
    rng = np.random.default_rng(seed)
    work = g
    # mapping: original node -> node of the current work graph.
    mapping: dict[Hashable, Hashable] = {u: u for u in g.nodes}
    init: dict[Hashable, int] = {u: i for i, u in enumerate(work.nodes)}
    best = dict(init)

    for _ in range(max_levels):
        comm = dict(init)
        moved = _local_move(work, comm, resolution, rng)
        best = {orig: comm[wn] for orig, wn in mapping.items()}
        if not moved:
            break
        refined = _refine(work, comm, resolution, rng)
        if len(set(refined.values())) == work.number_of_nodes():
            break  # no aggregation progress possible; comm is final
        new_work = _aggregate(work, refined)
        # Seed next level with the parent (local-move) partition.
        init = {refined[u]: comm[u] for u in work.nodes}
        mapping = {orig: refined[wn] for orig, wn in mapping.items()}
        work = new_work

    return _densify(g, best)
