"""Small weighted undirected graph + union-find.

Backs the ER-problem similarity graph (vertices = ER problems) and the
record match graphs inside the Almser AL loop (vertices = records of a
cluster's problems). Both are small enough for adjacency dicts.
"""
from __future__ import annotations

from collections.abc import Hashable, Iterable


class Graph:
    """Weighted undirected graph with O(1) neighbour lookup.

    Self-loops are allowed (weight counted once in ``total_weight`` but
    twice in the node's weighted degree, the usual modularity
    convention). Adding an existing edge overwrites its weight.
    """

    def __init__(self) -> None:
        self._adj: dict[Hashable, dict[Hashable, float]] = {}

    def add_node(self, u: Hashable) -> None:
        self._adj.setdefault(u, {})

    def add_edge(self, u: Hashable, v: Hashable, weight: float = 1.0) -> None:
        self.add_node(u)
        self.add_node(v)
        self._adj[u][v] = float(weight)
        self._adj[v][u] = float(weight)

    def remove_edge(self, u: Hashable, v: Hashable) -> None:
        self._adj[u].pop(v, None)
        if u != v:
            self._adj[v].pop(u, None)

    def has_edge(self, u: Hashable, v: Hashable) -> bool:
        return v in self._adj.get(u, {})

    def neighbors(self, u: Hashable) -> dict[Hashable, float]:
        return self._adj[u]

    def weight(self, u: Hashable, v: Hashable) -> float:
        return self._adj.get(u, {}).get(v, 0.0)

    @property
    def nodes(self) -> list[Hashable]:
        return list(self._adj)

    def edges(self) -> Iterable[tuple[Hashable, Hashable, float]]:
        seen = set()
        for u, nbrs in self._adj.items():
            for v, w in nbrs.items():
                key = (u, v) if id(u) <= id(v) else (v, u)
                # Use a canonical frozenset key so each undirected edge
                # yields exactly once regardless of hash ordering.
                fkey = frozenset((u, v)) if u != v else (u,)
                if fkey in seen:
                    continue
                seen.add(fkey)
                yield u, v, w

    def degree(self, u: Hashable) -> float:
        """Weighted degree; a self-loop contributes twice its weight."""
        d = 0.0
        for v, w in self._adj[u].items():
            d += 2 * w if v == u else w
        return d

    @property
    def total_weight(self) -> float:
        """Sum of edge weights, each undirected edge counted once."""
        return sum(w for _, _, w in self.edges())

    def number_of_nodes(self) -> int:
        return len(self._adj)

    def number_of_edges(self) -> int:
        return sum(1 for _ in self.edges())

    def subgraph(self, keep: set) -> "Graph":
        g = Graph()
        for u in self._adj:
            if u in keep:
                g.add_node(u)
        for u, v, w in self.edges():
            if u in keep and v in keep:
                g.add_edge(u, v, w)
        return g


class UnionFind:
    """Path-compressed, rank-unioned disjoint sets over hashable keys."""

    def __init__(self) -> None:
        self._parent: dict[Hashable, Hashable] = {}
        self._rank: dict[Hashable, int] = {}

    def find(self, x: Hashable) -> Hashable:
        if x not in self._parent:
            self._parent[x] = x
            self._rank[x] = 0
            return x
        root = x
        while self._parent[root] != root:
            root = self._parent[root]
        while self._parent[x] != root:
            self._parent[x], x = root, self._parent[x]
        return root

    def union(self, a: Hashable, b: Hashable) -> None:
        ra, rb = self.find(a), self.find(b)
        if ra == rb:
            return
        if self._rank[ra] < self._rank[rb]:
            ra, rb = rb, ra
        self._parent[rb] = ra
        if self._rank[ra] == self._rank[rb]:
            self._rank[ra] += 1

    def groups(self) -> dict[Hashable, list[Hashable]]:
        out: dict[Hashable, list[Hashable]] = {}
        for x in self._parent:
            out.setdefault(self.find(x), []).append(x)
        return out


def connected_components(g: Graph) -> list[set]:
    """Connected components of ``g`` (isolated nodes are singletons)."""
    uf = UnionFind()
    for u in g.nodes:
        uf.find(u)
    for u, v, _ in g.edges():
        uf.union(u, v)
    return [set(members) for members in uf.groups().values()]
