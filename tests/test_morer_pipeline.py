"""Integration tests for the end-to-end MoRER pipeline (§4, Fig. 3)."""
import numpy as np
import pytest
from pyspark.sql import functions as F

from repro.core.morer import MorerConfig, init_repository, run_morer, solve
from repro.erdata import build_problems
from repro.ml.metrics import spark_prf, spark_prf_per_problem
from repro.oracle import assert_equivalent


@pytest.fixture(scope="module")
def wdc(spark):
    return build_problems(spark, "wdc", scale=0.4, seed=0)


@pytest.fixture(scope="module")
def dexter(spark):
    return build_problems(spark, "dexter", scale=0.4, seed=0)


@pytest.fixture(scope="module")
def wdc_result(spark, wdc):
    return run_morer(spark, wdc, MorerConfig(b_tot=150, b_min=10, seed=0))


# -- repository initialisation --------------------------------------------
def test_repo_covers_all_initial_problems(spark, wdc):
    repo, _ = init_repository(spark, wdc, MorerConfig(b_tot=150, b_min=10))
    covered = {p for e in repo.entries.values() for p in e.problem_ids}
    assert covered == set(wdc.p_init)
    assert repo.trained_problems == set(wdc.p_init)


def test_repo_labels_within_budget(spark, wdc):
    cfg = MorerConfig(b_tot=120, b_min=10)
    repo, _ = init_repository(spark, wdc, cfg)
    assert 0 < repo.labels_spent <= cfg.b_tot + cfg.b_min * len(repo.entries)


def test_repo_every_entry_has_model_and_vectors(spark, wdc):
    repo, _ = init_repository(spark, wdc, MorerConfig(b_tot=150, b_min=10))
    for e in repo.entries.values():
        assert e.model["kind"] == "forest"
        assert e.n_train == len(e.train_y) == len(e.train_X)
        assert e.train_summary.n == e.n_train


def test_supervised_labels_everything(spark, wdc):
    repo, _ = init_repository(
        spark, wdc, MorerConfig(al="supervised", b_tot=150, b_min=10)
    )
    n_init = wdc.init_pairs.count()
    assert repo.labels_spent == n_init


# -- solve / sel_base ------------------------------------------------------
def test_solve_assigns_every_unsolved_problem(wdc, wdc_result):
    assert set(wdc_result.assignment) == set(wdc.p_unsolved)
    assert all(cid in wdc_result.repo.entries for cid in wdc_result.assignment.values())


def test_solve_predictions_cover_all_unsolved_pairs(wdc, wdc_result):
    assert wdc_result.predictions.count() == wdc.unsolved_pairs.count()


def test_solve_quality_reasonable(wdc_result):
    m = spark_prf(wdc_result.predictions)
    assert m["f1"] > 0.6


def test_solve_timings_recorded(wdc_result):
    for key in ("summarize", "cluster", "model_gen", "selection", "classify", "total"):
        assert key in wdc_result.timings
        assert wdc_result.timings[key] >= 0


def test_predictions_binary(wdc_result):
    vals = {r.pred for r in wdc_result.predictions.select("pred").distinct().collect()}
    assert vals <= {0, 1}


def test_per_problem_counts_against_oracle(wdc_result):
    got = spark_prf_per_problem(wdc_result.predictions)
    assert_equivalent(
        got,
        "SELECT problem_id, "
        "sum(CASE WHEN label=1 AND pred=1 THEN 1 ELSE 0 END) AS tp, "
        "sum(CASE WHEN label=0 AND pred=1 THEN 1 ELSE 0 END) AS fp, "
        "sum(CASE WHEN label=1 AND pred=0 THEN 1 ELSE 0 END) AS fn "
        "FROM preds GROUP BY problem_id",
        preds=wdc_result.predictions,
    )


# -- sel_cov ---------------------------------------------------------------
def test_sel_cov_extends_trained_problems(spark, wdc):
    cfg = MorerConfig(b_tot=150, b_min=10, selection="cov", t_cov=0.1, seed=0)
    res = run_morer(spark, wdc, cfg)
    # With a low threshold, unsolved problems trigger integration:
    # T grows beyond P_I and extra labels are spent.
    assert len(res.repo.trained_problems) > len(wdc.p_init)
    assert res.labels_spent > 150 * 0.5  # more than the init share alone


def test_sel_cov_high_threshold_spends_less(spark, wdc):
    low = run_morer(
        spark, wdc, MorerConfig(b_tot=150, b_min=10, selection="cov", t_cov=0.1)
    )
    high = run_morer(
        spark, wdc, MorerConfig(b_tot=150, b_min=10, selection="cov", t_cov=0.9)
    )
    assert high.labels_spent <= low.labels_spent


def test_sel_cov_quality_not_worse_than_base(spark, wdc, wdc_result):
    res = run_morer(
        spark, wdc, MorerConfig(b_tot=150, b_min=10, selection="cov", t_cov=0.1)
    )
    base_f1 = spark_prf(wdc_result.predictions)["f1"]
    cov_f1 = spark_prf(res.predictions)["f1"]
    assert cov_f1 >= base_f1 - 0.05  # Fig. 8: sel_cov >= sel_base (noise margin)


# -- config surface (Table 3) ---------------------------------------------
@pytest.mark.parametrize("test", ["ks", "wd", "psi"])
def test_all_distribution_tests_run(spark, wdc, test):
    res = run_morer(spark, wdc, MorerConfig(test=test, b_tot=100, b_min=10))
    assert spark_prf(res.predictions)["f1"] > 0.5


@pytest.mark.parametrize("clustering", ["leiden", "label_prop"])
def test_both_clusterings_run(spark, wdc, clustering):
    res = run_morer(spark, wdc, MorerConfig(clustering=clustering, b_tot=100, b_min=10))
    assert spark_prf(res.predictions)["f1"] > 0.5


def test_invalid_al_method_raises(spark, wdc):
    with pytest.raises(ValueError):
        run_morer(spark, wdc, MorerConfig(al="nope", b_tot=100))


def test_invalid_selection_raises(spark, wdc):
    with pytest.raises(ValueError):
        run_morer(spark, wdc, MorerConfig(selection="nope", b_tot=100))


# -- dexter: bigger multi-cluster case ------------------------------------
def test_dexter_pipeline_multicluster(spark, dexter):
    res = run_morer(spark, dexter, MorerConfig(b_tot=200, b_min=10, seed=0))
    assert len(res.repo.entries) >= 2  # heterogeneous problems -> clusters
    m = spark_prf(res.predictions)
    assert m["f1"] > 0.55
    # Every unsolved problem got some model.
    assert set(res.assignment) == set(dexter.p_unsolved)


def test_dexter_seed_changes_al_but_not_structure(spark, dexter):
    a = run_morer(spark, dexter, MorerConfig(b_tot=200, b_min=10, seed=0))
    b = run_morer(spark, dexter, MorerConfig(b_tot=200, b_min=10, seed=1))
    assert set(a.repo.partition) == set(b.repo.partition)
