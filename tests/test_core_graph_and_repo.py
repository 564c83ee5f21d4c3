"""Tests for the problem graph, repository persistence and classify path."""
import numpy as np
import pandas as pd
import pytest

from repro.core.classify import classify_pairs
from repro.core.distribution import summary_from_matrix
from repro.core.problem_graph import (
    build_problem_graph,
    cluster_problems,
    insert_problem,
)
from repro.core.repository import ClusterEntry, ModelRepository
from repro.erdata.features import FEATURES
from repro.ml import RandomForest, model_to_dict
from repro.ml.metrics import spark_prf
from repro.oracle import assert_equivalent


def _summaries(groups: dict[str, float], n=300, seed=0):
    """Problems whose feature distributions shift by group."""
    rng = np.random.default_rng(seed)
    out = {}
    for pid, shift in groups.items():
        X = np.clip(rng.random((n, 4)) * 0.5 + shift, 0, 1)
        out[pid] = summary_from_matrix(X, pid)
    return out


GROUPS = {"a1": 0.0, "a2": 0.02, "a3": 0.01, "b1": 0.45, "b2": 0.47, "b3": 0.46}


# -- problem graph ---------------------------------------------------------
def test_graph_has_all_problem_vertices():
    g = build_problem_graph(_summaries(GROUPS), "ks")
    assert set(g.nodes) == set(GROUPS)


def test_graph_median_pruning_halves_edges():
    s = _summaries(GROUPS)
    full = build_problem_graph(s, "ks", prune=None)
    pruned = build_problem_graph(s, "ks", prune="median")
    assert pruned.number_of_edges() < full.number_of_edges()
    assert full.number_of_edges() == 15  # complete graph on 6 vertices


def test_graph_clustering_recovers_groups():
    g = build_problem_graph(_summaries(GROUPS), "ks")
    part = cluster_problems(g, "leiden", seed=0)
    assert part["a1"] == part["a2"] == part["a3"]
    assert part["b1"] == part["b2"] == part["b3"]
    assert part["a1"] != part["b1"]


def test_graph_clustering_label_prop_agrees():
    g = build_problem_graph(_summaries(GROUPS), "ks")
    part = cluster_problems(g, "label_prop", seed=0)
    assert part["a1"] == part["a2"] and part["b1"] == part["b2"]
    assert part["a1"] != part["b1"]


def test_graph_clustering_unknown_algorithm():
    g = build_problem_graph(_summaries(GROUPS), "ks")
    with pytest.raises(ValueError):
        cluster_problems(g, "kmeans")


def test_insert_problem_connects_to_right_group():
    s = _summaries(GROUPS)
    g = build_problem_graph(s, "ks")
    rng = np.random.default_rng(9)
    new = summary_from_matrix(np.clip(rng.random((300, 4)) * 0.5, 0, 1), "a_new")
    insert_problem(g, s, new, "ks")
    assert "a_new" in g.nodes
    assert "a_new" in s
    part = cluster_problems(g, "leiden", seed=0)
    assert part["a_new"] == part["a1"]


def test_graph_float_prune_threshold():
    s = _summaries(GROUPS)
    g = build_problem_graph(s, "ks", prune=0.99)
    # Only near-identical problems stay connected at 0.99.
    assert g.number_of_edges() <= 6


# -- repository persistence ------------------------------------------------
def _repo_with_model(tmp_path):
    rng = np.random.default_rng(1)
    X = rng.random((200, 4))
    y = (X.mean(axis=1) > 0.5).astype(np.int64)
    model = RandomForest(n_estimators=5, seed=0).fit(X, y)
    repo = ModelRepository(test="ks")
    repo.summaries = _summaries({"a1": 0.0, "b1": 0.4})
    repo.graph = build_problem_graph(repo.summaries, "ks", prune=None)
    repo.partition = {"a1": 0, "b1": 1}
    repo.trained_problems = {"a1", "b1"}
    repo.labels_spent = 42
    repo.entries[0] = ClusterEntry(
        cid=0,
        problem_ids=["a1"],
        model=model_to_dict(model),
        train_summary=summary_from_matrix(X, "<c0>"),
        n_train=200,
        budget_assigned=100,
        train_X=X,
        train_y=y,
    )
    return repo, X


def test_repository_save_load_round_trip(tmp_path):
    repo, X = _repo_with_model(tmp_path)
    path = tmp_path / "repo.json"
    repo.save(path)
    loaded = ModelRepository.load(path)
    assert loaded.test == "ks"
    assert loaded.labels_spent == 42
    assert loaded.trained_problems == {"a1", "b1"}
    assert loaded.partition == repo.partition
    e = loaded.entries[0]
    assert e.n_train == 200
    np.testing.assert_allclose(e.train_X, X)
    np.testing.assert_allclose(
        e.train_summary.hist, repo.entries[0].train_summary.hist
    )
    from repro.ml import model_from_dict

    m0 = model_from_dict(repo.entries[0].model)
    m1 = model_from_dict(e.model)
    np.testing.assert_allclose(m1.predict_proba(X), m0.predict_proba(X))


def test_repository_untrained_problems(tmp_path):
    repo, _ = _repo_with_model(tmp_path)
    repo.partition["c9"] = 0
    assert repo.untrained_problems == {"c9"}


def test_repository_next_cid(tmp_path):
    repo, _ = _repo_with_model(tmp_path)
    assert repo.next_cid() == 1
    assert ModelRepository(test="ks").next_cid() == 0


def test_repository_model_for_problem(tmp_path):
    repo, _ = _repo_with_model(tmp_path)
    assert repo.model_for_problem("a1") is not None
    assert repo.model_for_problem("b1") is None  # cluster 1 has no entry
    assert repo.model_for_problem("zz") is None


# -- classify path ---------------------------------------------------------
@pytest.fixture(scope="module")
def pairs_and_model(spark):
    rng = np.random.default_rng(3)
    frames = []
    for pid in ("p0", "p1"):
        X = rng.random((400, 4))
        pdf = pd.DataFrame(X, columns=FEATURES)
        pdf.insert(0, "problem_id", pid)
        pdf["src"] = np.arange(400)
        pdf["tgt"] = np.arange(400) + 1_000_000
        pdf["label"] = (X.mean(axis=1) > 0.5).astype(int)
        pdf["text_a"] = "x"
        pdf["text_b"] = "y"
        frames.append(pdf)
    pdf_all = pd.concat(frames, ignore_index=True)
    sdf = spark.createDataFrame(pdf_all)
    model = RandomForest(n_estimators=10, seed=0).fit(
        pdf_all[FEATURES].to_numpy(), pdf_all["label"].to_numpy()
    )
    return sdf, pdf_all, model


def test_classify_matches_driver_prediction(spark, pairs_and_model):
    sdf, pdf, model = pairs_and_model
    md = model_to_dict(model)
    out = classify_pairs(spark, sdf, {"p0": md, "p1": md}).toPandas()
    out = out.sort_values(["problem_id", "src"]).reset_index(drop=True)
    ref = pdf.sort_values(["problem_id", "src"]).reset_index(drop=True)
    expect = model.predict(ref[FEATURES].to_numpy())
    np.testing.assert_array_equal(out["pred"].to_numpy(), expect)


def test_classify_unassigned_problem_predicts_zero(spark, pairs_and_model):
    sdf, _, model = pairs_and_model
    out = classify_pairs(spark, sdf, {"p0": model_to_dict(model)})
    p1 = out.where("problem_id = 'p1'").toPandas()
    assert (p1["pred"] == 0).all()


def test_classify_different_models_per_problem(spark, pairs_and_model):
    sdf, pdf, model = pairs_and_model
    from repro.ml import LogisticRegression

    lin = LogisticRegression(n_iter=100).fit(
        pdf[FEATURES].to_numpy(), pdf["label"].to_numpy()
    )
    out = classify_pairs(
        spark, sdf, {"p0": model_to_dict(model), "p1": model_to_dict(lin)}
    ).toPandas()
    ref0 = pdf[pdf.problem_id == "p0"].sort_values("src")
    got0 = out[out.problem_id == "p0"].sort_values("src")
    np.testing.assert_array_equal(
        got0["pred"].to_numpy(), model.predict(ref0[FEATURES].to_numpy())
    )
    ref1 = pdf[pdf.problem_id == "p1"].sort_values("src")
    got1 = out[out.problem_id == "p1"].sort_values("src")
    np.testing.assert_array_equal(
        got1["pred"].to_numpy(), lin.predict(ref1[FEATURES].to_numpy())
    )


def test_spark_prf_against_oracle(spark, pairs_and_model):
    sdf, _, model = pairs_and_model
    md = model_to_dict(model)
    preds = classify_pairs(spark, sdf, {"p0": md, "p1": md}).cache()
    m = spark_prf(preds)
    from pyspark.sql import functions as F

    got = preds.agg(
        F.sum(((F.col("label") == 1) & (F.col("pred") == 1)).cast("long")).alias("tp"),
        F.sum(((F.col("label") == 0) & (F.col("pred") == 1)).cast("long")).alias("fp"),
        F.sum(((F.col("label") == 1) & (F.col("pred") == 0)).cast("long")).alias("fn"),
    )
    assert_equivalent(
        got,
        "SELECT sum(CASE WHEN label=1 AND pred=1 THEN 1 ELSE 0 END) AS tp, "
        "sum(CASE WHEN label=0 AND pred=1 THEN 1 ELSE 0 END) AS fp, "
        "sum(CASE WHEN label=1 AND pred=0 THEN 1 ELSE 0 END) AS fn FROM p",
        p=preds,
    )
    row = got.collect()[0]
    assert m["tp"] == row.tp and m["fp"] == row.fp and m["fn"] == row.fn
