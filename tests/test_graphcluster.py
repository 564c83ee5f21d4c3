"""Unit tests for the graph substrate: Graph/UnionFind/Leiden/label prop."""
import numpy as np
import pytest
from hypothesis import given, settings
from hypothesis import strategies as st

from repro.graphcluster import (
    Graph,
    UnionFind,
    connected_components,
    label_propagation,
    leiden,
    modularity,
)


def two_cliques(k=5, bridge_w=0.01):
    """Two k-cliques (weight 1.0 inside) joined by one weak bridge."""
    g = Graph()
    for base in (0, 100):
        for i in range(k):
            for j in range(i + 1, k):
                g.add_edge(base + i, base + j, 1.0)
    g.add_edge(0, 100, bridge_w)
    return g


# -- Graph ----------------------------------------------------------------
def test_add_edge_symmetric():
    g = Graph()
    g.add_edge("a", "b", 0.5)
    assert g.weight("a", "b") == 0.5 == g.weight("b", "a")


def test_edge_overwrite():
    g = Graph()
    g.add_edge(1, 2, 0.3)
    g.add_edge(1, 2, 0.9)
    assert g.weight(1, 2) == 0.9
    assert g.number_of_edges() == 1


def test_total_weight_counts_each_edge_once():
    g = Graph()
    g.add_edge(1, 2, 1.0)
    g.add_edge(2, 3, 2.0)
    assert g.total_weight == 3.0


def test_self_loop_degree_and_weight():
    g = Graph()
    g.add_edge(1, 1, 2.0)
    g.add_edge(1, 2, 1.0)
    assert g.degree(1) == 2 * 2.0 + 1.0
    assert g.total_weight == 3.0


def test_isolated_node():
    g = Graph()
    g.add_node("x")
    assert g.nodes == ["x"]
    assert g.degree("x") == 0.0


def test_subgraph():
    g = two_cliques(4)
    sub = g.subgraph(set(range(4)))
    assert sub.number_of_nodes() == 4
    assert sub.number_of_edges() == 6


def test_remove_edge():
    g = Graph()
    g.add_edge(1, 2, 1.0)
    g.remove_edge(1, 2)
    assert not g.has_edge(1, 2)
    assert g.number_of_edges() == 0


# -- UnionFind / components ----------------------------------------------
def test_union_find_basic():
    uf = UnionFind()
    uf.union(1, 2)
    uf.union(3, 4)
    assert uf.find(1) == uf.find(2)
    assert uf.find(3) == uf.find(4)
    assert uf.find(1) != uf.find(3)
    uf.union(2, 3)
    assert uf.find(1) == uf.find(4)


def test_union_find_groups():
    uf = UnionFind()
    for a, b in [(1, 2), (2, 3), (10, 11)]:
        uf.union(a, b)
    uf.find(99)
    sizes = sorted(len(v) for v in uf.groups().values())
    assert sizes == [1, 2, 3]


@given(st.lists(st.tuples(st.integers(0, 20), st.integers(0, 20)), max_size=60))
@settings(max_examples=50, deadline=None)
def test_union_find_matches_bruteforce(edges):
    uf = UnionFind()
    for a, b in edges:
        uf.union(a, b)
    # Brute-force transitive closure over the same edges.
    comp = {n: {n} for e in edges for n in e}
    for a, b in edges:
        merged = comp[a] | comp[b]
        for n in merged:
            comp[n] = merged
    for a, b in edges:
        assert (uf.find(a) == uf.find(b)) == (b in comp[a])


def test_connected_components():
    g = two_cliques(3, bridge_w=0.5)
    assert len(connected_components(g)) == 1
    g2 = Graph()
    g2.add_edge(1, 2)
    g2.add_node(3)
    comps = sorted(connected_components(g2), key=len)
    assert [len(c) for c in comps] == [1, 2]


# -- modularity -----------------------------------------------------------
def test_modularity_single_community_zero():
    g = two_cliques(4)
    part = {u: 0 for u in g.nodes}
    assert modularity(g, part) == pytest.approx(0.0, abs=1e-12)


def test_modularity_good_split_positive():
    g = two_cliques(5)
    part = {u: (0 if u < 100 else 1) for u in g.nodes}
    assert modularity(g, part) > 0.4


def test_modularity_bad_split_lower():
    g = two_cliques(5)
    good = {u: (0 if u < 100 else 1) for u in g.nodes}
    bad = {u: (u % 2) for u in g.nodes}
    assert modularity(g, good) > modularity(g, bad)


def test_modularity_empty_graph():
    assert modularity(Graph(), {}) == 0.0


# -- leiden ---------------------------------------------------------------
def test_leiden_two_cliques():
    g = two_cliques(5)
    part = leiden(g, seed=0)
    a = {part[u] for u in range(5)}
    b = {part[u] for u in range(100, 105)}
    assert len(a) == 1 and len(b) == 1 and a != b


def test_leiden_three_cliques():
    g = Graph()
    for base in (0, 100, 200):
        for i in range(4):
            for j in range(i + 1, 4):
                g.add_edge(base + i, base + j, 1.0)
    g.add_edge(0, 100, 0.05)
    g.add_edge(100, 200, 0.05)
    part = leiden(g, seed=1)
    assert len(set(part.values())) == 3


def test_leiden_deterministic_per_seed():
    g = two_cliques(6)
    assert leiden(g, seed=3) == leiden(g, seed=3)


def test_leiden_empty_and_singleton():
    assert leiden(Graph()) == {}
    g = Graph()
    g.add_node("only")
    assert leiden(g) == {"only": 0}


def test_leiden_disconnected_components_not_merged():
    g = Graph()
    g.add_edge(1, 2, 1.0)
    g.add_edge(3, 4, 1.0)
    part = leiden(g, seed=0)
    assert part[1] == part[2]
    assert part[3] == part[4]
    assert part[1] != part[3]


def test_leiden_beats_or_matches_trivial_partition():
    rng = np.random.default_rng(0)
    g = Graph()
    # Random 3-community graph: dense inside, sparse across.
    for c in range(3):
        nodes = list(range(c * 10, c * 10 + 10))
        for i in nodes:
            for j in nodes:
                if i < j and rng.random() < 0.7:
                    g.add_edge(i, j, 1.0)
    for _ in range(8):
        a, b = rng.integers(0, 30, 2)
        if a // 10 != b // 10:
            g.add_edge(int(a), int(b), 0.2)
    part = leiden(g, seed=0)
    single = {u: 0 for u in g.nodes}
    assert modularity(g, part) >= modularity(g, single)
    assert modularity(g, part) > 0.3


def test_leiden_resolution_monotone_cluster_count():
    g = two_cliques(5, bridge_w=2.0)
    low = leiden(g, resolution=0.1, seed=0)
    high = leiden(g, resolution=2.0, seed=0)
    assert len(set(low.values())) <= len(set(high.values()))


def test_leiden_dense_ids():
    g = two_cliques(4)
    part = leiden(g, seed=0)
    ids = set(part.values())
    assert ids == set(range(len(ids)))


# -- label propagation ----------------------------------------------------
def test_label_prop_two_cliques():
    g = two_cliques(6)
    part = label_propagation(g, seed=0)
    a = {part[u] for u in range(6)}
    b = {part[u] for u in range(100, 106)}
    assert len(a) == 1 and len(b) == 1 and a != b


def test_label_prop_isolated_nodes_stay_singleton():
    g = Graph()
    g.add_node(1)
    g.add_node(2)
    part = label_propagation(g, seed=0)
    assert part[1] != part[2]


def test_label_prop_deterministic_per_seed():
    g = two_cliques(5)
    assert label_propagation(g, seed=2) == label_propagation(g, seed=2)
