"""Unit tests for sel_base / sel_cov (§4.5) against a fabricated repo."""
import numpy as np
import pytest

from repro.core.distribution import summary_from_matrix
from repro.core.problem_graph import build_problem_graph
from repro.core.repository import ClusterEntry, ModelRepository
from repro.core.selection import sel_base, sel_cov
from repro.ml import LogisticRegression, model_to_dict


def _mat(shift, n=300, seed=0):
    rng = np.random.default_rng(seed)
    return np.clip(rng.random((n, 4)) * 0.5 + shift, 0, 1)


def _entry(cid, pids, shift, seed):
    X = _mat(shift, seed=seed)
    y = (X.mean(axis=1) > 0.4).astype(np.int64)
    m = LogisticRegression(n_iter=50).fit(X, y)
    return ClusterEntry(
        cid=cid,
        problem_ids=pids,
        model=model_to_dict(m),
        train_summary=summary_from_matrix(X, f"<c{cid}>"),
        n_train=len(X),
        budget_assigned=100,
        train_X=X,
        train_y=y,
    )


@pytest.fixture()
def repo():
    r = ModelRepository(test="ks")
    r.summaries = {
        "a1": summary_from_matrix(_mat(0.0, seed=1), "a1"),
        "a2": summary_from_matrix(_mat(0.02, seed=2), "a2"),
        "b1": summary_from_matrix(_mat(0.45, seed=3), "b1"),
        "b2": summary_from_matrix(_mat(0.47, seed=4), "b2"),
    }
    r.graph = build_problem_graph(r.summaries, "ks")
    r.partition = {"a1": 0, "a2": 0, "b1": 1, "b2": 1}
    r.trained_problems = {"a1", "a2", "b1", "b2"}
    r.entries[0] = _entry(0, ["a1", "a2"], 0.0, 10)
    r.entries[1] = _entry(1, ["b1", "b2"], 0.45, 11)
    return r


def test_sel_base_picks_matching_cluster(repo):
    new_a = summary_from_matrix(_mat(0.01, seed=20), "new_a")
    new_b = summary_from_matrix(_mat(0.46, seed=21), "new_b")
    assert sel_base(repo, new_a) == 0
    assert sel_base(repo, new_b) == 1


def test_sel_base_empty_repo_raises():
    with pytest.raises(ValueError):
        sel_base(ModelRepository(test="ks"), summary_from_matrix(_mat(0.0), "x"))


def _callbacks(repo, log):
    def vector_count(p):
        return repo.summaries[p].n if p in repo.summaries else 300

    def train_new(members, budget):
        log.append(("new", tuple(sorted(members)), budget))
        cid = repo.next_cid()
        repo.entries[cid] = _entry(cid, sorted(members), 0.2, 99)
        repo.trained_problems.update(members)
        return cid

    def retrain(cid, untrained, budget):
        log.append(("retrain", cid, tuple(sorted(untrained)), budget))
        repo.trained_problems.update(untrained)

    return vector_count, train_new, retrain


def test_sel_cov_reuses_similar_cluster_without_retrain(repo):
    log = []
    vc, tn, rt = _callbacks(repo, log)
    new = summary_from_matrix(_mat(0.01, seed=30), "new_a")
    cid = sel_cov(repo, new, vc, tn, rt, t_cov=0.9)
    assert cid == 0
    assert log == []  # coverage below threshold -> plain reuse
    assert "new_a" in repo.partition


def test_sel_cov_triggers_retrain_at_low_threshold(repo):
    log = []
    vc, tn, rt = _callbacks(repo, log)
    new = summary_from_matrix(_mat(0.03, seed=31), "new_a")
    cid = sel_cov(repo, new, vc, tn, rt, t_cov=0.05)
    assert cid == 0
    assert log and log[0][0] == "retrain"
    assert log[0][1] == 0
    assert "new_a" in log[0][2]
    assert "new_a" in repo.trained_problems


def test_sel_cov_trains_new_cluster_for_alien_problem(repo):
    log = []
    vc, tn, rt = _callbacks(repo, log)
    # A distribution unlike both clusters: ends up alone (or with other
    # untrained problems) -> a fresh model must be trained.
    new = summary_from_matrix(np.clip(_mat(0.0, seed=32) * 0.2 + 0.85, 0, 1), "alien")
    cid = sel_cov(repo, new, vc, tn, rt, t_cov=0.25, default_budget=42)
    if log and log[0][0] == "new":
        assert log[0][2] == 42
        assert cid in repo.entries
    else:
        # Graph pruning may still attach it to an existing cluster; the
        # contract is just: a usable cluster id comes back.
        assert cid in repo.entries


def test_sel_cov_updates_graph_and_summaries(repo):
    log = []
    vc, tn, rt = _callbacks(repo, log)
    n_nodes = repo.graph.number_of_nodes()
    new = summary_from_matrix(_mat(0.46, seed=33), "new_b")
    sel_cov(repo, new, vc, tn, rt, t_cov=0.9)
    assert repo.graph.number_of_nodes() == n_nodes + 1
    assert "new_b" in repo.summaries


def test_sel_cov_retrain_budget_eq14(repo):
    """The retrain budget must follow Eq. 14: cov * |T ∩ C_prev|."""
    log = []
    vc, tn, rt = _callbacks(repo, log)
    new = summary_from_matrix(_mat(0.02, seed=34), "new_a")
    sel_cov(repo, new, vc, tn, rt, t_cov=0.01)
    assert log and log[0][0] == "retrain"
    budget = log[0][3]
    # cov = 300 new vectors / (300 + 600 cluster vectors) = 1/3;
    # n_prev_train = 300 -> Eq. 14 gives ~100.
    assert budget == pytest.approx(100, abs=5)
