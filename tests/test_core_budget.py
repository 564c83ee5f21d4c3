"""Tests for the budget distribution (Eqs. 4–9) and Eq. 14."""
import pytest
from hypothesis import given, settings
from hypothesis import strategies as st

from repro.core.budget import BudgetPlan, ClusterInfo, distribute_budget, retrain_budget


def ci(cid, n_problems, n_vectors):
    return ClusterInfo(cid, [f"p{cid}_{i}" for i in range(n_problems)], n_vectors)


def test_single_cluster_gets_everything_up_to_capacity():
    plan = distribute_budget([ci(0, 3, 1000)], b_tot=100, b_min=10)
    assert plan.per_cluster == {0: 100}


def test_budget_capped_by_vector_count():
    plan = distribute_budget([ci(0, 2, 40)], b_tot=100, b_min=10)
    assert plan.per_cluster[0] == 40


def test_every_cluster_receives_minimum():
    clusters = [ci(0, 3, 5000), ci(1, 2, 100), ci(2, 2, 100)]
    plan = distribute_budget(clusters, b_tot=300, b_min=25)
    assert all(v >= 25 for v in plan.per_cluster.values())


def test_proportional_to_vector_counts():
    clusters = [ci(0, 2, 9000), ci(1, 2, 1000)]
    plan = distribute_budget(clusters, b_tot=500, b_min=10)
    assert plan.per_cluster[0] > plan.per_cluster[1] * 3


def test_total_never_exceeds_budget_when_capacity_suffices():
    clusters = [ci(0, 2, 10_000), ci(1, 3, 10_000)]
    plan = distribute_budget(clusters, b_tot=400, b_min=20)
    assert plan.total == 400


def test_eq4_merges_singletons_when_minima_dont_fit():
    clusters = [ci(0, 4, 2000)] + [ci(i, 1, 50) for i in range(1, 10)]
    plan = distribute_budget(clusters, b_tot=100, b_min=20)
    # 10 clusters x 20 > 100 -> singletons merged into the non-singleton.
    assert set(plan.per_cluster) == {0}
    assert set(plan.merged_into) == set(range(1, 10))
    assert all(host == 0 for host in plan.merged_into.values())


def test_singleton_affinity_respected():
    clusters = [ci(0, 3, 1000), ci(1, 2, 1000), ci(2, 1, 50)]
    plan = distribute_budget(
        clusters, b_tot=50, b_min=20, singleton_affinity={2: 1}
    )
    assert plan.merged_into.get(2) == 1


def test_b_min_lowered_when_all_singletons_dont_fit():
    clusters = [ci(i, 1, 100) for i in range(10)]
    plan = distribute_budget(clusters, b_tot=50, b_min=20)
    # No non-singleton host exists -> b_min drops so minima fit.
    assert plan.b_min_used <= 5
    assert plan.total <= 50


def test_singleton_and_nonsingleton_groups_split_remainder():
    clusters = [ci(0, 3, 3000), ci(1, 1, 3000)]
    plan = distribute_budget(clusters, b_tot=400, b_min=50)
    # Eq. 6/7: ns holds 3 of 4 problems -> ns share of b_rem = 0.75.
    b_rem = 400 - 2 * 50
    assert plan.per_cluster[0] == pytest.approx(50 + 0.75 * b_rem, abs=1)
    assert plan.per_cluster[1] == pytest.approx(50 + 0.25 * b_rem, abs=1)


def test_empty_cluster_list():
    assert distribute_budget([], b_tot=100, b_min=10).per_cluster == {}


def test_zero_vector_clusters_ignored():
    plan = distribute_budget([ci(0, 2, 0), ci(1, 2, 500)], b_tot=100, b_min=10)
    assert plan.per_cluster.get(1, 0) >= 90


@given(
    st.lists(
        st.tuples(st.integers(1, 4), st.integers(1, 5000)),
        min_size=1,
        max_size=12,
    ),
    st.integers(20, 2000),
    st.integers(1, 50),
)
@settings(max_examples=80, deadline=None)
def test_budget_invariants_property(specs, b_tot, b_min):
    clusters = [ci(i, np_, nv) for i, (np_, nv) in enumerate(specs)]
    plan = distribute_budget(clusters, b_tot=b_tot, b_min=b_min)
    total_capacity = sum(c.n_vectors for c in clusters)
    # Never exceed the budget nor the labelable vectors.
    assert plan.total <= max(b_tot, plan.b_min_used * len(plan.per_cluster))
    assert plan.total <= total_capacity
    for cid, b in plan.per_cluster.items():
        assert b >= 0
    # Merged singletons receive no budget of their own.
    assert not set(plan.merged_into) & set(plan.per_cluster)


# -- Eq. 14 ---------------------------------------------------------------
def test_retrain_budget_formula():
    assert retrain_budget(b_tot=1000, coverage=0.5, n_prev_train=200) == 100


def test_retrain_budget_zero_coverage():
    assert retrain_budget(b_tot=1000, coverage=0.0, n_prev_train=200) == 0


def test_retrain_budget_minimum_one():
    assert retrain_budget(b_tot=1000, coverage=0.001, n_prev_train=10) == 1


@given(st.floats(0.0, 1.0), st.integers(0, 5000))
@settings(max_examples=50, deadline=None)
def test_retrain_budget_bounded_property(cov, n_prev):
    b = retrain_budget(1000, cov, n_prev)
    assert 0 <= b <= max(1, n_prev)
