"""Model selection for new ER problems (paper §4.5).

``sel_base`` — compare the new problem's distribution summary against
each cluster's training-vector summary ``P_{C_i}`` with the same
distribution test used to build the graph; pick the most similar
cluster's model. No retraining.

``sel_cov`` — insert the problem into the graph, re-cluster with
Leiden, then per Fig. 4: (a) if the problem lands in a cluster whose
members are all untrained (all in U), train a fresh model; (b)
otherwise reuse the model of the *previous* cluster with maximum
overlap among the new cluster's trained members, and (c) when the
coverage ratio (Eq. 13) of untrained vectors exceeds ``t_cov``,
retrain that model with the Eq. 14 budget on vectors from U-problems.
The re-clustering/training helpers are callbacks so this module stays
free of Spark/AL dependencies.
"""
from __future__ import annotations

from collections.abc import Callable

from repro.core.budget import retrain_budget
from repro.core.distribution import ProblemSummary, problem_similarity
from repro.core.problem_graph import cluster_problems, insert_problem
from repro.core.repository import ModelRepository


def sel_base(repo: ModelRepository, new: ProblemSummary) -> int:
    """Most similar cluster by sim_p against each entry's P_{C_i}."""
    if not repo.entries:
        raise ValueError("empty repository")
    best_cid, best_sim = None, -1.0
    for cid in sorted(repo.entries):
        e = repo.entries[cid]
        sim = problem_similarity(new, e.train_summary, repo.test)
        if sim > best_sim:
            best_cid, best_sim = cid, sim
    return best_cid


def sel_cov(
    repo: ModelRepository,
    new: ProblemSummary,
    vector_count: Callable[[str], int],
    train_new_cluster: Callable[[list[str], int], int],
    retrain_cluster: Callable[[int, list[str], int], None],
    t_cov: float = 0.25,
    default_budget: int = 50,
    prune: str | float | None = "median",
    clustering: str = "leiden",
    seed: int = 0,
) -> int:
    """Integrate ``new`` into the repository; returns the cluster id to use.

    Parameters
    ----------
    vector_count : #feature vectors of a problem (for Eq. 13 coverage).
    train_new_cluster : callback(problem_ids, budget) -> new cid; trains
        and registers a model for an all-untrained cluster.
    retrain_cluster : callback(cid, untrained_problem_ids, budget);
        updates the cluster's model with fresh AL labels (Eq. 14).
    """
    prev_partition = dict(repo.partition)
    insert_problem(repo.graph, repo.summaries, new, repo.test, prune)
    partition = cluster_problems(repo.graph, algorithm=clustering, seed=seed)
    repo.partition = partition

    pid = new.problem_id
    members = [p for p, c in partition.items() if c == partition[pid]]
    trained = [p for p in members if p in repo.trained_problems]

    if not trained:
        # All members in U: build a model for this brand-new cluster.
        return train_new_cluster(members, default_budget)

    # Reuse the previous cluster with maximum overlap among trained members.
    overlap: dict[int, int] = {}
    for p in trained:
        prev_cid = prev_partition.get(p)
        if prev_cid is not None and prev_cid in repo.entries:
            overlap[prev_cid] = overlap.get(prev_cid, 0) + 1
    if not overlap:
        return train_new_cluster(members, default_budget)
    cid = max(sorted(overlap), key=lambda c: overlap[c])

    # Eq. 13: share of vectors from untrained problems in the new cluster.
    untrained = [p for p in members if p not in repo.trained_problems]
    n_u = sum(vector_count(p) for p in untrained)
    n_all = sum(vector_count(p) for p in members)
    cov = n_u / n_all if n_all else 0.0
    if cov > t_cov and untrained:
        budget = retrain_budget(
            b_tot=repo.entries[cid].budget_assigned or default_budget,
            coverage=cov,
            n_prev_train=repo.entries[cid].n_train,
        )
        retrain_cluster(cid, untrained, budget)
    return cid
