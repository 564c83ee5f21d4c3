"""Weighted label propagation (Raghavan et al., 2007).

The alternative graph clustering the paper reports as giving similar
results to Leiden (§4.3); kept so that choice is testable here too.
"""
from __future__ import annotations

from collections.abc import Hashable

import numpy as np

from repro.graphcluster.graph import Graph


def label_propagation(
    g: Graph, seed: int = 0, max_iter: int = 100
) -> dict[Hashable, int]:
    """Cluster ``g``; returns node -> dense community id.

    Each node repeatedly adopts the label with the largest summed edge
    weight among its neighbours (ties broken by smallest label for
    determinism) until no label changes or ``max_iter`` sweeps.
    """
    rng = np.random.default_rng(seed)
    labels: dict[Hashable, int] = {u: i for i, u in enumerate(g.nodes)}
    nodes = list(g.nodes)
    for _ in range(max_iter):
        rng.shuffle(nodes)
        changed = False
        for u in nodes:
            weight_by_label: dict[int, float] = {}
            for v, w in g.neighbors(u).items():
                if v == u:
                    continue
                weight_by_label[labels[v]] = weight_by_label.get(labels[v], 0.0) + w
            if not weight_by_label:
                continue
            best_w = max(weight_by_label.values())
            candidates = sorted(
                lbl for lbl, w in weight_by_label.items() if w >= best_w - 1e-12
            )
            new = candidates[0]
            # Keep the current label when it is among the best (stability).
            if labels[u] in candidates:
                new = labels[u]
            if new != labels[u]:
                labels[u] = new
                changed = True
        if not changed:
            break
    remap: dict[int, int] = {}
    out: dict[Hashable, int] = {}
    for u in g.nodes:
        c = labels[u]
        if c not in remap:
            remap[c] = len(remap)
        out[u] = remap[c]
    return out
