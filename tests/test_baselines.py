"""Tests for every baseline the paper compares against (§5.2)."""
import numpy as np
import pandas as pd
import pytest

from repro.baselines import (
    run_almser_standalone,
    run_anymatch,
    run_ditto,
    run_multiem,
    run_sudowoodo,
    run_transer,
)
from repro.baselines.multiem_proxy import _otsu
from repro.baselines.textfeat import pair_text_features
from repro.baselines.transer import _pseudo_labels, _structural_filter
from repro.erdata import build_problems
from repro.ml.metrics import spark_prf


@pytest.fixture(scope="module")
def wdc(spark):
    return build_problems(spark, "wdc", scale=0.4, seed=0)


@pytest.fixture(scope="module")
def music(spark):
    return build_problems(spark, "music", scale=0.3, seed=0)


# -- shared surface --------------------------------------------------------
RUNNERS = {
    "almser": lambda spark, su: run_almser_standalone(spark, su, budget=100),
    "transer": lambda spark, su: run_transer(spark, su),
    "ditto": lambda spark, su: run_ditto(spark, su, epochs=30),
    "sudowoodo": lambda spark, su: run_sudowoodo(spark, su, budget=100, epochs=5),
    "multiem": lambda spark, su: run_multiem(spark, su),
    "anymatch": lambda spark, su: run_anymatch(spark, su),
}


@pytest.mark.parametrize("name", sorted(RUNNERS))
def test_baseline_covers_all_unsolved_pairs(spark, wdc, name):
    res = RUNNERS[name](spark, wdc)
    assert res.predictions.count() == wdc.unsolved_pairs.count()
    assert res.train_time >= 0 and res.classify_time > 0
    vals = {r.pred for r in res.predictions.select("pred").distinct().collect()}
    assert vals <= {0, 1}


@pytest.mark.parametrize("name", sorted(RUNNERS))
def test_baseline_beats_trivial_on_music(spark, music, name):
    """Music is the easy dataset: every method must clear F1 0.5."""
    res = RUNNERS[name](spark, music)
    assert spark_prf(res.predictions)["f1"] > 0.5


def test_multiem_uses_no_labels(spark, wdc):
    assert run_multiem(spark, wdc).labels_spent == 0


def test_almser_standalone_spends_budget(spark, wdc):
    res = run_almser_standalone(spark, wdc, budget=80)
    assert res.labels_spent == 80


def test_sudowoodo_respects_budget(spark, wdc):
    res = run_sudowoodo(spark, wdc, budget=60, epochs=3)
    assert res.labels_spent <= 60


def test_transer_variants_label_accounting(spark, wdc):
    full = run_transer(spark, wdc, train_fraction=1.0)
    half = run_transer(spark, wdc, train_fraction=0.5)
    assert full.name == "transer_all" and half.name == "transer_50"
    assert half.labels_spent < full.labels_spent


def test_ditto_variants(spark, wdc):
    half = run_ditto(spark, wdc, train_fraction=0.5, epochs=20)
    assert half.name == "ditto_50"
    assert half.labels_spent < wdc.init_pairs.count()


def test_anymatch_sample_size(spark, wdc):
    res = run_anymatch(spark, wdc, n_r=50)
    assert res.labels_spent <= 50


# -- unit pieces -----------------------------------------------------------
def test_otsu_separates_bimodal():
    counts = np.zeros(50)
    counts[5] = 100  # mass around 0.11
    counts[45] = 100  # mass around 0.91
    thr = _otsu(counts)
    # Any cut strictly between the two modes is an optimal Otsu cut.
    assert 0.11 < thr < 0.91


def test_otsu_empty_histogram():
    assert _otsu(np.zeros(50)) == 0.5


def test_pseudo_labels_learn_from_source():
    rng = np.random.default_rng(0)
    Xs = rng.random((500, 4))
    ys = (Xs.mean(axis=1) > 0.5).astype(np.int64)
    Xt = rng.random((200, 4))
    labels, confident = _pseudo_labels(Xt, Xs, ys, k=10, t_c=0.9)
    truth = (Xt.mean(axis=1) > 0.5).astype(np.int64)
    assert confident.mean() > 0.3
    assert (labels[confident] == truth[confident]).mean() > 0.9


def test_structural_filter_removes_inconsistent():
    rng = np.random.default_rng(1)
    Xt = rng.random((300, 4))
    labels = (Xt.mean(axis=1) > 0.5).astype(np.int64)
    flipped = labels.copy()
    flip_idx = rng.choice(300, 30, replace=False)
    flipped[flip_idx] ^= 1  # inconsistent labels should get filtered
    keep = _structural_filter(Xt, flipped, np.ones(300, bool), k=10, t_l=0.9)
    assert keep[flip_idx].mean() < keep.mean()


def test_pair_text_features_shape_and_range():
    a = pd.Series(["alpha beta gamma", "x y"])
    b = pd.Series(["alpha beta gamma", "completely different"])
    X = pair_text_features(a, b, dim=16)
    assert X.shape == (2, 17)
    assert X[0, 16] == pytest.approx(1.0)  # identical -> Jaccard 1
    assert X[1, 16] == 0.0
    assert (X >= 0).all() and (X <= 1).all()


def test_pair_text_features_deterministic_hash():
    a = pd.Series(["samsung tv xj500"])
    b = pd.Series(["samsung tv xj500b"])
    X1 = pair_text_features(a, b, dim=32)
    X2 = pair_text_features(a, b, dim=32)
    np.testing.assert_array_equal(X1, X2)
