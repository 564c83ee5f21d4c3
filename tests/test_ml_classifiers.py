"""Unit tests for the from-scratch classifiers (no Spark needed)."""
import numpy as np
import pytest

from repro.ml import (
    MLP,
    DecisionTree,
    LogisticRegression,
    RandomForest,
    model_from_dict,
    model_to_dict,
)

ALL_MODELS = [
    lambda: LogisticRegression(n_iter=300),
    lambda: DecisionTree(max_depth=6),
    lambda: RandomForest(n_estimators=10, max_depth=6, seed=1),
    lambda: MLP(hidden=16, epochs=100, lr=0.3, seed=2),
]
MODEL_IDS = ["logreg", "tree", "forest", "mlp"]


def _separable(n=200, d=4, seed=0):
    """Linearly separable similarity-feature-like data in [0, 1]."""
    rng = np.random.default_rng(seed)
    X = rng.random((n, d))
    y = (X.mean(axis=1) > 0.5).astype(np.int64)
    return X, y


def _xor(n=400, seed=0):
    rng = np.random.default_rng(seed)
    X = rng.random((n, 2))
    y = ((X[:, 0] > 0.5) ^ (X[:, 1] > 0.5)).astype(np.int64)
    return X, y


@pytest.mark.parametrize("make", ALL_MODELS, ids=MODEL_IDS)
def test_fits_separable_data(make):
    X, y = _separable()
    m = make().fit(X, y)
    acc = (m.predict(X) == y).mean()
    assert acc > 0.9, f"train accuracy {acc:.3f} too low"


@pytest.mark.parametrize("make", ALL_MODELS, ids=MODEL_IDS)
def test_generalises_to_held_out(make):
    X, y = _separable(n=400, seed=1)
    Xt, yt = _separable(n=200, seed=99)
    m = make().fit(X, y)
    acc = (m.predict(Xt) == yt).mean()
    # The boundary is diagonal, so axis-aligned trees land lower than the
    # linear models; 0.8 still rules out degenerate fits.
    assert acc > 0.8


@pytest.mark.parametrize("make", ALL_MODELS, ids=MODEL_IDS)
def test_proba_in_unit_interval(make):
    X, y = _separable(n=100)
    p = make().fit(X, y).predict_proba(X)
    assert p.shape == (100,)
    assert (p >= 0).all() and (p <= 1).all()


@pytest.mark.parametrize("make", ALL_MODELS, ids=MODEL_IDS)
def test_predict_is_thresholded_proba(make):
    X, y = _separable(n=100)
    m = make().fit(X, y)
    np.testing.assert_array_equal(m.predict(X), (m.predict_proba(X) >= 0.5).astype(int))


@pytest.mark.parametrize("make", ALL_MODELS, ids=MODEL_IDS)
def test_serialisation_round_trip(make):
    X, y = _separable(n=150)
    m = make().fit(X, y)
    d = model_to_dict(m)
    assert isinstance(d, dict) and "kind" in d
    m2 = model_from_dict(d)
    np.testing.assert_allclose(m2.predict_proba(X), m.predict_proba(X))


@pytest.mark.parametrize("make", ALL_MODELS, ids=MODEL_IDS)
def test_unfitted_raises(make):
    with pytest.raises(RuntimeError):
        make().predict_proba(np.zeros((3, 4)))


@pytest.mark.parametrize("make", ALL_MODELS, ids=MODEL_IDS)
def test_single_class_training(make):
    """All-negative training data must not crash and must predict negative."""
    rng = np.random.default_rng(3)
    X = rng.random((50, 4))
    y = np.zeros(50, dtype=np.int64)
    m = make().fit(X, y)
    assert m.predict(X).sum() <= 2  # logreg/mlp may sit near 0.5 on a few


def test_tree_fits_xor():
    X, y = _xor()
    t = DecisionTree(max_depth=4).fit(X, y)
    assert (t.predict(X) == y).mean() > 0.95


def test_forest_fits_xor():
    X, y = _xor()
    f = RandomForest(n_estimators=20, max_depth=5, seed=7).fit(X, y)
    assert (f.predict(X) == y).mean() > 0.95


def test_logreg_cannot_fit_xor():
    """Sanity: a linear model should not solve XOR (guards the test data)."""
    X, y = _xor()
    m = LogisticRegression(n_iter=300).fit(X, y)
    assert (m.predict(X) == y).mean() < 0.7


def test_mlp_fits_xor():
    X, y = _xor(n=600)
    m = MLP(hidden=32, epochs=400, lr=0.5, seed=0).fit(X, y)
    assert (m.predict(X) == y).mean() > 0.9


def test_tree_deterministic():
    X, y = _separable(n=120, seed=5)
    a = DecisionTree(max_depth=6).fit(X, y).predict_proba(X)
    b = DecisionTree(max_depth=6).fit(X, y).predict_proba(X)
    np.testing.assert_array_equal(a, b)


def test_forest_seed_changes_ensemble():
    X, y = _xor(n=200, seed=4)
    a = RandomForest(n_estimators=5, seed=0).fit(X, y).predict_proba(X)
    b = RandomForest(n_estimators=5, seed=123).fit(X, y).predict_proba(X)
    assert not np.allclose(a, b)


def test_forest_reproducible_for_same_seed():
    X, y = _xor(n=200, seed=4)
    a = RandomForest(n_estimators=5, seed=9).fit(X, y).predict_proba(X)
    b = RandomForest(n_estimators=5, seed=9).fit(X, y).predict_proba(X)
    np.testing.assert_array_equal(a, b)


def test_tree_min_samples_leaf_respected():
    X, y = _separable(n=100, seed=6)
    t = DecisionTree(max_depth=10, min_samples_leaf=20).fit(X, y)
    # Count samples reaching each leaf: every leaf must hold >= 20.
    feat = np.asarray(t.feature)
    idx = np.zeros(X.shape[0], dtype=np.int64)
    thr = np.asarray(t.threshold)
    left, right = np.asarray(t.left), np.asarray(t.right)
    active = feat[idx] >= 0
    while active.any():
        cur = idx[active]
        go_left = X[active, feat[cur]] <= thr[cur]
        idx[np.nonzero(active)[0]] = np.where(go_left, left[cur], right[cur])
        active = feat[idx] >= 0
    counts = np.bincount(idx, minlength=len(feat))
    leaves = np.nonzero(feat == -1)[0]
    reached = counts[leaves]
    assert (reached[reached > 0] >= 20).all()


def test_tree_depth_zero_is_majority_vote():
    X, y = _separable(n=100, seed=7)
    t = DecisionTree(max_depth=0).fit(X, y)
    assert len(t.feature) == 1 and t.feature[0] == -1
    assert np.allclose(t.predict_proba(X), y.mean())


def test_tree_constant_features_leaf():
    X = np.zeros((30, 3))
    y = np.array([0, 1] * 15)
    t = DecisionTree(max_depth=5).fit(X, y)
    # No split possible on constant features -> single leaf at the prior.
    assert np.allclose(t.predict_proba(X), 0.5)
