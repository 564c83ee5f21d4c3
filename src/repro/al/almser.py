"""Almser-lite: graph-boosted AL for multi-source ER (Primpeli & Bizer
[30], paper §4.4 / baseline).

Faithful-in-mechanism reimplementation of the signals the original
uses (its GitHub implementation is not available offline):

* a committee (bagged trees) predicts match probabilities for the pool;
* confident predicted matches form a **record similarity graph** whose
  *cleaned* connected components give graph-inferred labels — two
  records in the same component are transitively a match, records in
  different components are not;
* the informativeness of an unlabeled pair is the disagreement between
  its graph-inferred label and the committee probability, plus the
  committee uncertainty — exactly the false-positive / false-negative
  hunting via transitive closure the paper describes (§3);
* the top-``batch`` pairs are labeled each round.

Rebuilding the graph over the full pool each round is what makes Almser
the paper's slow-but-strong AL method; MoRER speeds it up by handing it
only one cluster's pool (§5.3).
"""
from __future__ import annotations

import numpy as np
import pandas as pd

from repro.al.oracle_labels import LabelOracle
from repro.al.bootstrap import _seed_indices
from repro.erdata.features import FEATURES
from repro.graphcluster import UnionFind
from repro.ml import DecisionTree, RandomForest

#: committee probability above which an edge enters the match graph
_EDGE_CONF = 0.7
#: components larger than this are considered dirty and are re-split by
#: dropping their weakest edges (the original's "cleaned" components)
_MAX_COMPONENT = 12


def _graph_analysis(
    pool: pd.DataFrame, p_hat: np.ndarray, labeled: np.ndarray, y: np.ndarray
) -> tuple[np.ndarray, np.ndarray]:
    """Per-pair graph signals from cleaned connected components.

    Returns ``(graph_label, component_evidence)``: the transitive-
    closure label (same cleaned component) and a per-pair evidence
    score derived from the component sizes of both records (large
    components carry more transitive support). This per-pair analysis
    over the *whole pool* every iteration is the cost that grows with
    the similarity graph — the paper's explanation for Almser's
    runtime (§5.3).
    """
    uf = UnionFind()
    # Labeled matches are trusted edges; confident predictions as well.
    edge_idx = np.nonzero(((p_hat >= _EDGE_CONF) & ~labeled) | (labeled & (y == 1)))[0]
    # Clean: add edges strongest-first, refuse edges that would grow a
    # component beyond _MAX_COMPONENT (min-cut-flavoured FP control).
    comp_size: dict = {}
    order = edge_idx[np.argsort(-p_hat[edge_idx])]
    src = pool["src"].to_numpy()
    tgt = pool["tgt"].to_numpy()
    for i in order:
        a, b = uf.find(src[i]), uf.find(tgt[i])
        if a == b:
            continue
        na = comp_size.get(a, 1)
        nb = comp_size.get(b, 1)
        if na + nb > _MAX_COMPONENT:
            continue
        uf.union(a, b)
        comp_size[uf.find(a)] = na + nb
    roots_a = np.array([uf.find(r) for r in src])
    roots_b = np.array([uf.find(r) for r in tgt])
    size_a = np.array([comp_size.get(r, 1) for r in roots_a], dtype=np.float64)
    size_b = np.array([comp_size.get(r, 1) for r in roots_b], dtype=np.float64)
    g_label = (roots_a == roots_b).astype(np.float64)
    evidence = np.minimum(size_a, size_b) / _MAX_COMPONENT
    return g_label, evidence


def almser_al(
    pool: pd.DataFrame,
    budget: int,
    oracle: LabelOracle,
    committee_size: int = 100,
    batch: int = 5,
    seed: int = 0,
    features: list[str] = FEATURES,
) -> tuple[RandomForest, pd.DataFrame]:
    """Run Almser-lite AL on ``pool``; returns (model, labeled subset)."""
    rng = np.random.default_rng(seed)
    X = pool[features].to_numpy(dtype=np.float64)
    y_true = pool["label"].to_numpy(dtype=np.int64)
    n = len(pool)
    budget = min(budget, n, oracle.remaining)

    labeled = np.zeros(n, dtype=bool)
    y = np.full(n, -1, dtype=np.int64)
    seed_idx = _seed_indices(X, min(2 * batch, max(2, budget)), rng)[:budget]
    y[seed_idx] = oracle.query(y_true[seed_idx])
    labeled[seed_idx] = True

    while labeled.sum() < budget and not labeled.all():
        idx_l = np.nonzero(labeled)[0]
        Xl, yl = X[idx_l], y[idx_l]
        probs = np.zeros(n)
        fit_n = min(len(idx_l), 128)  # committee fit cost stays bounded;
        # the pool-sized prediction + graph analysis dominates, as in
        # the original system.
        for i in range(committee_size):
            bs = rng.integers(0, len(idx_l), size=fit_n)
            t = DecisionTree(max_depth=6, seed=seed + 7 * i)
            t.fit(Xl[bs], yl[bs])
            probs += t.predict_proba(X)
        p_hat = probs / committee_size

        g_label, evidence = _graph_analysis(pool, p_hat, labeled, y)
        # Disagreement between transitive-closure evidence and the
        # committee + committee uncertainty = informativeness; pairs
        # whose components carry more transitive support weigh higher.
        info = (
            np.abs(p_hat - g_label) * (0.5 + 0.5 * evidence)
            + 0.5 * p_hat * (1.0 - p_hat)
        )
        info[labeled] = -1.0
        # No early stop: the budget is the only termination criterion.
        take = min(batch, budget - int(labeled.sum()))
        pick = np.argsort(-info)[:take]
        y[pick] = oracle.query(y_true[pick])
        labeled[pick] = True

    idx_l = np.nonzero(labeled)[0]
    model = RandomForest(n_estimators=30, max_depth=10, seed=seed)
    model.fit(X[idx_l], y[idx_l])
    return model, pool.iloc[idx_l]
