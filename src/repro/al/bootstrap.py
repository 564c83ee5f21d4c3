"""Bootstrap uncertainty AL (Mozafari et al. [23], paper §4.4).

Iteratively: train ``k`` classifiers on bootstrap resamples of the
current training set T, score every unlabeled vector with the vote
uncertainty

    unc(w) = p_hat * (1 - p_hat),   p_hat = (1/k) * sum_i m_i(w)   (Eq. 10)

optionally multiplied by the IDF-style record-uniqueness score

    s(w) = (s_r(src) + s_r(tgt)) / 2                               (Eq. 11)
    s_r(r) = log(|C_P| / |C_{P|r}|)                                (Eq. 12*)

(*the paper writes ``log(|C_{P|r}| / |C_P|)``, which is <= 0 and would
invert the ranking; we implement the IDF reading — DESIGN.md §5), and
label the top-``batch`` vectors. Bootstrap members are shallow CART
trees: re-fitting k of them per round is what makes this the paper's
*fast* AL method.
"""
from __future__ import annotations

import numpy as np
import pandas as pd

from repro.al.oracle_labels import LabelOracle
from repro.erdata.features import FEATURES
from repro.ml import DecisionTree, RandomForest


def _seed_indices(X: np.ndarray, n_seed: int, rng: np.random.Generator) -> np.ndarray:
    """Initial queries: vectors with extreme mean similarity (likely
    matches and likely non-matches) so T starts with both classes."""
    mean_sim = X.mean(axis=1)
    order = np.argsort(mean_sim)
    half = max(1, n_seed // 2)
    low = order[:half]
    high = order[-half:]
    return np.unique(np.concatenate([low, high]))


def record_scores(
    pool: pd.DataFrame, cluster_of_problem: dict[str, int], n_clusters: int
) -> np.ndarray:
    """Per-vector uniqueness score s(w) (Eqs. 11–12) for ``pool``.

    ``cluster_of_problem`` maps problem_id -> cluster id over *all*
    clustered problems (the repository's partition); records occurring
    in many clusters score low.
    """
    occur: dict[int, set[int]] = {}
    for rid_col in ("src", "tgt"):
        for rid, pid in zip(pool[rid_col].to_numpy(), pool["problem_id"]):
            occur.setdefault(int(rid), set()).add(cluster_of_problem.get(pid, -1))
    n_c = max(1, n_clusters)

    def s_r(rid: int) -> float:
        k = max(1, len(occur.get(int(rid), set())))
        return float(np.log(max(n_c, k) / k)) if n_c > 1 else 1.0

    src_s = pool["src"].map(s_r).to_numpy(dtype=np.float64)
    tgt_s = pool["tgt"].map(s_r).to_numpy(dtype=np.float64)
    s = (src_s + tgt_s) / 2.0
    # A zero score would erase the uncertainty signal entirely; floor it.
    return np.maximum(s, 0.05)


def bootstrap_al(
    pool: pd.DataFrame,
    budget: int,
    oracle: LabelOracle,
    k: int = 100,
    batch: int = 10,
    seed: int = 0,
    scores: np.ndarray | None = None,
    features: list[str] = FEATURES,
) -> tuple[RandomForest, pd.DataFrame]:
    """Run Bootstrap AL on one cluster's pool.

    Returns the final model (random forest on the labeled set) and the
    labeled subset of ``pool`` (the cluster's ``P_{C_i}`` vectors).
    """
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
        votes = np.zeros(n)
        fit_n = min(len(idx_l), 128)  # bounded committee fit cost
        for i in range(k):
            bs = rng.integers(0, len(idx_l), size=fit_n)
            t = DecisionTree(max_depth=4, seed=seed + i)
            t.fit(Xl[bs], yl[bs])
            votes += t.predict(X)
        p_hat = votes / k
        unc = p_hat * (1.0 - p_hat)  # Eq. 10
        if scores is not None:
            unc = unc * scores
        unc[labeled] = -1.0
        # No early stop: as in the original, the budget is the only
        # termination criterion — uninformative rounds still label the
        # top-ranked vectors.
        take = min(batch, budget - int(labeled.sum()))
        pick = np.argsort(-unc)[:take]
        y[pick] = oracle.query(y_true[pick])
        labeled[pick] = True

    idx_l = np.nonzero(labeled)[0]
    model = RandomForest(n_estimators=30, max_depth=10, seed=seed)
    model.fit(X[idx_l], y[idx_l])
    return model, pool.iloc[idx_l]
