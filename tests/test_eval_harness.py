"""Tests for the evaluation harness and the table builders' mechanics."""
import numpy as np
import pytest

from repro.erdata import build_problems
from repro.eval.harness import METHODS, run_method
from repro.eval.tables import (
    BUDGET_MAP,
    PAPER_TABLE2,
    PAPER_TABLE4,
    PAPER_TABLE5,
    TABLE4_BASELINES,
    table2,
)
from repro.ml.metrics import prf


@pytest.fixture(scope="module")
def wdc(spark):
    return build_problems(spark, "wdc", scale=0.3, seed=0)


def test_run_method_morer(spark, wdc):
    r = run_method(spark, wdc, "morer_bootstrap", budget=100)
    assert r.dataset == "wdc" and r.budget == 100
    assert 0 <= r.f1 <= 1
    assert r.total_time > 0
    assert r.extra["n_clusters"] >= 1


def test_run_method_baseline(spark, wdc):
    r = run_method(spark, wdc, "multiem")
    assert r.labels_spent == 0
    assert r.classify_time > 0


def test_run_method_overrides(spark, wdc):
    r = run_method(
        spark, wdc, "morer_bootstrap", budget=100,
        morer_overrides={"test": "psi", "selection": "cov", "t_cov": 0.5},
    )
    assert 0 <= r.f1 <= 1


def test_run_method_unknown_raises(spark, wdc):
    with pytest.raises(ValueError):
        run_method(spark, wdc, "nope")


def test_methods_list_complete():
    assert set(METHODS) >= {"morer_bootstrap", "morer_almser", "almser",
                            "transer_all", "ditto_all", "sudowoodo",
                            "multiem", "anymatch"}


# -- metrics ---------------------------------------------------------------
def test_prf_perfect():
    m = prf(np.array([1, 0, 1]), np.array([1, 0, 1]))
    assert m["f1"] == 1.0


def test_prf_all_wrong():
    m = prf(np.array([1, 1]), np.array([0, 0]))
    assert m["f1"] == 0.0 and m["fn"] == 2


def test_prf_mixed():
    m = prf(np.array([1, 1, 0, 0]), np.array([1, 0, 1, 0]))
    assert m["tp"] == 1 and m["fp"] == 1 and m["fn"] == 1
    assert m["precision"] == 0.5 and m["recall"] == 0.5 and m["f1"] == 0.5


def test_prf_empty():
    m = prf(np.array([]), np.array([]))
    assert m["f1"] == 0.0


# -- table constants (paper numbers present and sane) ---------------------
def test_paper_table2_rows():
    assert set(PAPER_TABLE2.dataset) == {"dexter", "wdc", "music"}
    d = PAPER_TABLE2.set_index("dataset")
    assert d.loc["dexter", "er_problems"] == 276


def test_paper_table4_complete_grid():
    for variant in ("morer_almser", "morer_bootstrap"):
        for ds in ("dexter", "music", "wdc"):
            for b in (1000, 1500, 2000):
                row = PAPER_TABLE4[(variant, ds, b)]
                assert set(row) == set(TABLE4_BASELINES)
                assert all(v > 0 for v in row.values())


def test_paper_table5_complete_grid():
    for b in (1000, 1500, 2000):
        for r in (0.3, 0.5):
            cell = PAPER_TABLE5[(b, r)]
            assert set(cell) == {"almser", "bootstrap"}
            for f1, std in cell.values():
                assert 0 < f1 <= 1 and std >= 0


def test_budget_map_monotone():
    pb = sorted(BUDGET_MAP)
    ours = [BUDGET_MAP[b] for b in pb]
    assert ours == sorted(ours)
    assert pb == [1000, 1500, 2000]


# -- table2 builder (small scale) -----------------------------------------
def test_table2_small_scale(spark):
    df = table2(spark, scale=0.25)
    assert set(df.dataset) == {"dexter", "wdc", "music"}
    assert (df.matches <= df.record_pairs).all()
    assert (df.paper_record_pairs > df.record_pairs).all()  # lite < paper
    d = df.set_index("dataset")
    # At tiny scales a Dexter source pair can lose all its candidate
    # pairs to blocking; the bench (scale 1.0) asserts the full 276.
    assert 270 <= d.loc["dexter", "er_problems"] <= 276
    assert d.loc["wdc", "er_problems"] == 12
    assert d.loc["music", "er_problems"] == 20
