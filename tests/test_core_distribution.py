"""Tests for the distribution analysis (§4.2): Spark summaries + tests."""
import numpy as np
import pandas as pd
import pytest
from hypothesis import given, settings
from hypothesis import strategies as st

from repro.core.distribution import (
    DISTRIBUTION_TESTS,
    ProblemSummary,
    feature_similarity,
    ks_statistic,
    problem_similarity,
    psi,
    summarize_problems,
    summary_from_matrix,
    wasserstein_distance,
)
from repro.erdata.features import FEATURES
from repro.oracle import assert_equivalent


def _summary_from(X: np.ndarray, pid="p", n_bins=100) -> ProblemSummary:
    return summary_from_matrix(np.asarray(X, dtype=float), pid, n_bins=n_bins)


def _uniformish(seed, n=500):
    return np.random.default_rng(seed).random((n, 4))


def _shifted(seed, n=500, shift=0.3):
    return np.clip(_uniformish(seed, n) + shift, 0, 1)


# -- summary_from_matrix ---------------------------------------------------
def test_summary_hist_sums_to_one():
    s = _summary_from(_uniformish(0))
    np.testing.assert_allclose(s.hist.sum(axis=1), 1.0)


def test_summary_cdf_monotone_ends_at_one():
    s = _summary_from(_uniformish(1))
    assert (np.diff(s.cdf, axis=1) >= -1e-12).all()
    np.testing.assert_allclose(s.cdf[:, -1], 1.0)


def test_summary_empty_matrix():
    s = summary_from_matrix(np.zeros((0, 4)))
    assert s.n == 0
    assert s.hist.sum() == 0.0


def test_summary_value_one_lands_in_last_bin():
    X = np.ones((10, 2))
    s = _summary_from(X, n_bins=10)
    np.testing.assert_allclose(s.hist[:, -1], 1.0)


def test_summary_std_matches_numpy():
    X = _uniformish(2)
    s = _summary_from(X)
    np.testing.assert_allclose(s.std, X.std(axis=0))


# -- distribution tests ----------------------------------------------------
@pytest.mark.parametrize("test", DISTRIBUTION_TESTS)
def test_identical_distributions_maximally_similar(test):
    a = _summary_from(_uniformish(3))
    assert feature_similarity(a, a, 0, test) == pytest.approx(1.0, abs=1e-6)


@pytest.mark.parametrize("test", DISTRIBUTION_TESTS)
def test_similarity_symmetric(test):
    a, b = _summary_from(_uniformish(4)), _summary_from(_shifted(5))
    for f in range(4):
        assert feature_similarity(a, b, f, test) == pytest.approx(
            feature_similarity(b, a, f, test), abs=1e-9
        )


@pytest.mark.parametrize("test", DISTRIBUTION_TESTS)
def test_similarity_in_unit_interval(test):
    a, b = _summary_from(_uniformish(6)), _summary_from(_shifted(7, shift=0.5))
    for f in range(4):
        assert 0.0 <= feature_similarity(a, b, f, test) <= 1.0


@pytest.mark.parametrize("test", DISTRIBUTION_TESTS)
def test_shifted_distribution_less_similar(test):
    a = _summary_from(_uniformish(8))
    near = _summary_from(_uniformish(9))
    far = _summary_from(_shifted(10, shift=0.5))
    for f in range(4):
        assert feature_similarity(a, near, f, test) > feature_similarity(a, far, f, test)


def test_ks_matches_manual_computation():
    a = _summary_from(np.full((100, 1), 0.2), n_bins=10)
    b = _summary_from(np.full((100, 1), 0.8), n_bins=10)
    # CDFs are step functions: a jumps at bin 2, b at bin 8 -> sup diff 1.
    assert ks_statistic(a, b, 0) == pytest.approx(1.0)


def test_wasserstein_proportional_to_shift():
    a = _summary_from(np.full((100, 1), 0.1), n_bins=100)
    b = _summary_from(np.full((100, 1), 0.3), n_bins=100)
    c = _summary_from(np.full((100, 1), 0.6), n_bins=100)
    assert wasserstein_distance(a, c, 0) > wasserstein_distance(a, b, 0)
    assert wasserstein_distance(a, b, 0) == pytest.approx(0.2, abs=0.02)


def test_psi_zero_for_identical():
    a = _summary_from(_uniformish(11))
    assert psi(a, a, 0) == pytest.approx(0.0, abs=1e-9)


def test_psi_positive_for_different():
    a = _summary_from(_uniformish(12))
    b = _summary_from(_shifted(13, shift=0.4))
    assert psi(a, b, 0) > 0.1


def test_unknown_test_raises():
    a = _summary_from(_uniformish(14))
    with pytest.raises(ValueError):
        feature_similarity(a, a, 0, "nope")


# -- problem_similarity (sim_p) -------------------------------------------
def test_problem_similarity_weighted_by_std():
    """A feature with zero variance must not influence sim_p."""
    rng = np.random.default_rng(15)
    Xa = np.hstack([rng.random((400, 1)), np.full((400, 1), 0.5)])
    Xb = np.hstack([rng.random((400, 1)), np.full((400, 1), 0.9)])
    a, b = _summary_from(Xa), _summary_from(Xb)
    # Feature 0 distributions are alike; feature 1 (constant, std=0)
    # differs wildly but carries no weight.
    assert problem_similarity(a, b, "ks") > 0.9


def test_problem_similarity_zero_weights_falls_back_to_mean():
    a = _summary_from(np.full((50, 2), 0.2))
    b = _summary_from(np.full((50, 2), 0.2))
    assert problem_similarity(a, b, "ks") == pytest.approx(1.0, abs=1e-6)


@given(st.integers(0, 10_000), st.integers(0, 10_000))
@settings(max_examples=25, deadline=None)
def test_problem_similarity_symmetric_property(s1, s2):
    a = _summary_from(_uniformish(s1, n=120))
    b = _summary_from(_shifted(s2, n=120, shift=0.2))
    for t in DISTRIBUTION_TESTS:
        assert problem_similarity(a, b, t) == pytest.approx(
            problem_similarity(b, a, t), abs=1e-9
        )


# -- summarize_problems (Spark) -------------------------------------------
@pytest.fixture(scope="module")
def toy_pairs(spark):
    rng = np.random.default_rng(0)
    frames = []
    for pid, shift in [("a", 0.0), ("b", 0.0), ("c", 0.45)]:
        X = np.clip(rng.random((300, 4)) + shift, 0, 1)
        pdf = pd.DataFrame(X, columns=FEATURES)
        pdf.insert(0, "problem_id", pid)
        pdf["src"] = np.arange(300)
        pdf["tgt"] = np.arange(300) + 1_000_000
        pdf["label"] = (X.mean(axis=1) > 0.5).astype(int)
        frames.append(pdf)
    return spark.createDataFrame(pd.concat(frames, ignore_index=True))


def test_summarize_problems_returns_all(toy_pairs):
    s = summarize_problems(toy_pairs)
    assert set(s) == {"a", "b", "c"}
    for v in s.values():
        assert v.n == 300
        np.testing.assert_allclose(v.hist.sum(axis=1), 1.0, atol=1e-9)


def test_summarize_matches_driver_side(toy_pairs):
    """The Spark histogram must equal the driver-side binning."""
    s = summarize_problems(toy_pairs, n_bins=50)
    pdf = toy_pairs.toPandas()
    for pid in ("a", "b", "c"):
        X = pdf[pdf.problem_id == pid][FEATURES].to_numpy(float)
        local = summary_from_matrix(X, pid, n_bins=50)
        np.testing.assert_allclose(s[pid].hist, local.hist, atol=1e-12)
        np.testing.assert_allclose(s[pid].std, local.std, atol=1e-9)


def test_summarize_similar_problems_score_high(toy_pairs):
    s = summarize_problems(toy_pairs)
    sim_ab = problem_similarity(s["a"], s["b"], "ks")
    sim_ac = problem_similarity(s["a"], s["c"], "ks")
    assert sim_ab > 0.9 > sim_ac


def test_summarize_oracle_stddev(spark, toy_pairs):
    """Cross-check the std aggregation against DuckDB."""
    from pyspark.sql import functions as F

    got = toy_pairs.groupBy("problem_id").agg(
        F.stddev_pop("f_title").alias("s0"), F.count("*").alias("n")
    )
    assert_equivalent(
        got,
        "SELECT problem_id, stddev_pop(f_title) AS s0, count(*) AS n "
        "FROM pairs GROUP BY problem_id",
        pairs=toy_pairs,
    )


def test_summarize_oracle_histogram(spark, toy_pairs):
    """Cross-check the binning aggregation against DuckDB."""
    from pyspark.sql import functions as F

    got = (
        toy_pairs.select(
            "problem_id",
            F.least(F.floor(F.col("f_title") * 20).cast("int"), F.lit(19)).alias("bin"),
        )
        .groupBy("problem_id", "bin")
        .agg(F.count("*").alias("c"))
    )
    assert_equivalent(
        got,
        "SELECT problem_id, least(CAST(floor(f_title * 20) AS INT), 19) AS bin, "
        "count(*) AS c FROM pairs GROUP BY 1, 2",
        pairs=toy_pairs,
    )
