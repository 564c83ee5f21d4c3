"""Table 3 — the parameter grid, asserted against MorerConfig."""
from repro.core.morer import MorerConfig


def test_default_distribution_test_is_ks():
    assert MorerConfig().test == "ks"  # Table 3 bold default


def test_default_selection_is_base():
    assert MorerConfig().selection == "base"


def test_al_options_cover_table3():
    # Table 3: model generation in {AL, supervised}; AL in {Bootstrap, Almser}.
    for al in ("bootstrap", "almser", "supervised"):
        assert MorerConfig(al=al).al == al


def test_distribution_test_options_cover_table3():
    for t in ("ks", "wd", "psi"):
        assert MorerConfig(test=t).test == t


def test_selection_options_cover_table3():
    for s in ("base", "cov"):
        assert MorerConfig(selection=s).selection == s


def test_bootstrap_k_matches_paper():
    assert MorerConfig().k_bootstrap == 100  # §5.2: k = 100


def test_n_bins_matches_paper():
    assert MorerConfig().n_bins == 100  # §4.2: |B| = 100


def test_default_clustering_is_leiden():
    assert MorerConfig().clustering == "leiden"  # §4.3
