"""Tests for the AL substrate: oracle, Bootstrap AL, Almser-lite AL."""
import numpy as np
import pandas as pd
import pytest

from repro.al import LabelOracle, almser_al, bootstrap_al
from repro.al.bootstrap import record_scores
from repro.erdata.features import FEATURES


def _pool(n=600, seed=0, pid="p0", hard=False):
    rng = np.random.default_rng(seed)
    X = rng.random((n, 4))
    y = (X.mean(axis=1) > (0.5 + (0.1 * rng.random(n) - 0.05) * hard)).astype(int)
    pdf = pd.DataFrame(X, columns=FEATURES)
    pdf.insert(0, "problem_id", pid)
    pdf["src"] = rng.integers(0, n // 3, n)
    pdf["tgt"] = rng.integers(1_000_000, 1_000_000 + n // 3, n)
    pdf["label"] = y
    return pdf


# -- oracle ----------------------------------------------------------------
def test_oracle_counts_queries():
    o = LabelOracle()
    out = o.query(np.array([1, 0, 1]))
    assert len(out) == 3 and o.spent == 3


def test_oracle_budget_truncates():
    o = LabelOracle(budget=2)
    out = o.query(np.array([1, 0, 1, 1]))
    assert len(out) == 2 and o.spent == 2 and o.remaining == 0


def test_oracle_unbounded_remaining():
    assert LabelOracle().remaining > 1_000_000


# -- bootstrap AL ----------------------------------------------------------
@pytest.mark.parametrize("budget", [30, 80])
def test_bootstrap_respects_budget(budget):
    pool = _pool()
    oracle = LabelOracle()
    model, labeled = bootstrap_al(pool, budget, oracle, k=10, batch=10, seed=0)
    assert oracle.spent == budget
    assert len(labeled) == budget


def test_bootstrap_model_learns():
    pool = _pool(n=800, seed=1)
    model, _ = bootstrap_al(pool, 100, LabelOracle(), k=10, batch=10, seed=0)
    acc = (
        model.predict(pool[FEATURES].to_numpy()) == pool["label"].to_numpy()
    ).mean()
    assert acc > 0.85


def test_bootstrap_beats_random_selection():
    """AL should pick more informative labels than a random sample."""
    pool = _pool(n=1200, seed=2, hard=True)
    X = pool[FEATURES].to_numpy()
    y = pool["label"].to_numpy()
    model, _ = bootstrap_al(pool, 60, LabelOracle(), k=20, batch=10, seed=0)
    al_acc = (model.predict(X) == y).mean()
    accs = []
    from repro.ml import RandomForest

    for s in range(5):
        rng = np.random.default_rng(100 + s)
        idx = rng.choice(len(pool), 60, replace=False)
        m = RandomForest(n_estimators=30, max_depth=10, seed=s).fit(X[idx], y[idx])
        accs.append((m.predict(X) == y).mean())
    assert al_acc >= np.mean(accs) - 0.02  # at least on par with random


def test_bootstrap_budget_larger_than_pool():
    pool = _pool(n=40)
    oracle = LabelOracle()
    model, labeled = bootstrap_al(pool, 500, oracle, k=5, batch=10, seed=0)
    assert oracle.spent <= 40
    assert len(labeled) <= 40


def test_bootstrap_deterministic():
    pool = _pool(n=300, seed=3)
    _, l1 = bootstrap_al(pool, 50, LabelOracle(), k=10, batch=10, seed=7)
    _, l2 = bootstrap_al(pool, 50, LabelOracle(), k=10, batch=10, seed=7)
    assert list(l1.index) == list(l2.index)


def test_bootstrap_scores_influence_selection():
    pool = _pool(n=400, seed=4)
    scores = np.ones(len(pool))
    scores[:200] = 0.05  # suppress the first half
    _, labeled = bootstrap_al(
        pool, 60, LabelOracle(), k=10, batch=10, seed=0, scores=scores
    )
    picked = np.asarray(labeled.index)
    # Seeds ignore scores, but the AL rounds should prefer the second half.
    post_seed = picked[20:]
    assert (post_seed >= 200).mean() > 0.6


# -- record scores (Eqs. 11-12) -------------------------------------------
def test_record_scores_idf_direction():
    pool = pd.concat(
        [_pool(100, seed=5, pid="p0"), _pool(100, seed=6, pid="p1")],
        ignore_index=True,
    )
    # p0 and p1 in different clusters; records shared across both score lower.
    pool.loc[0, "src"] = 777
    pool.loc[100, "src"] = 777  # occurs in both clusters
    pool.loc[1, "src"] = 888  # occurs in one cluster
    s = record_scores(pool, {"p0": 0, "p1": 1}, n_clusters=2)
    assert s[1] > s[0]


def test_record_scores_floor():
    pool = _pool(50, seed=7)
    s = record_scores(pool, {"p0": 0}, n_clusters=1)
    assert (s >= 0.05).all()


# -- Almser AL -------------------------------------------------------------
def test_almser_respects_budget():
    pool = _pool(n=500, seed=8)
    oracle = LabelOracle()
    model, labeled = almser_al(pool, 60, oracle, committee_size=10, batch=10, seed=0)
    assert oracle.spent == 60
    assert len(labeled) == 60


def test_almser_model_learns():
    pool = _pool(n=800, seed=9)
    model, _ = almser_al(pool, 100, LabelOracle(), committee_size=10, batch=10, seed=0)
    acc = (
        model.predict(pool[FEATURES].to_numpy()) == pool["label"].to_numpy()
    ).mean()
    # The pool's src/tgt ids are random, so the graph signal is noise
    # here — the bar is learning the feature boundary, not perfection.
    assert acc > 0.78


def test_almser_deterministic():
    pool = _pool(n=300, seed=10)
    _, l1 = almser_al(pool, 40, LabelOracle(), committee_size=8, batch=5, seed=3)
    _, l2 = almser_al(pool, 40, LabelOracle(), committee_size=8, batch=5, seed=3)
    assert list(l1.index) == list(l2.index)


def test_almser_graph_analysis_shapes():
    from repro.al.almser import _graph_analysis

    pool = _pool(n=200, seed=11)
    p_hat = np.random.default_rng(0).random(200)
    labeled = np.zeros(200, dtype=bool)
    y = np.full(200, -1)
    g_label, evidence = _graph_analysis(pool, p_hat, labeled, y)
    assert g_label.shape == (200,) and evidence.shape == (200,)
    assert set(np.unique(g_label)) <= {0.0, 1.0}
    assert (evidence >= 0).all() and (evidence <= 1).all()


def test_almser_confident_matches_form_components():
    from repro.al.almser import _graph_analysis

    pool = pd.DataFrame(
        {
            "problem_id": ["p"] * 3,
            "src": [1, 2, 1],
            "tgt": [10, 10, 11],
            "f_title": [0.9] * 3,
            "f_brand": [0.9] * 3,
            "f_model": [0.9] * 3,
            "f_price": [0.9] * 3,
            "label": [1, 1, 1],
        }
    )
    # Pairs (1,10) and (2,10) confidently match -> 1 and 2 share a
    # component -> pair (1,11) has no edge but records 1,11 unconnected.
    p_hat = np.array([0.9, 0.9, 0.1])
    g_label, _ = _graph_analysis(pool, p_hat, np.zeros(3, bool), np.full(3, -1))
    assert g_label[0] == 1.0 and g_label[1] == 1.0
    assert g_label[2] == 0.0
