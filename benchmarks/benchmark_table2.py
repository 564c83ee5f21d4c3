"""Benchmark target regenerating Table 2 (dataset statistics).

Writes ``table2_measured.csv`` next to the repo root so EXPERIMENTS.md
numbers can be refreshed from the bench run.
"""
import pathlib

import pytest

from repro.eval.tables import table2

_OUT = pathlib.Path(__file__).resolve().parent.parent / "results"


@pytest.mark.benchmark(group="table2")
def test_table2_stats(spark, benchmark):
    df = benchmark.pedantic(
        lambda: table2(spark, scale=1.0), rounds=1, iterations=1
    )
    _OUT.mkdir(exist_ok=True)
    df.to_csv(_OUT / "table2_measured.csv", index=False)
    assert set(df.dataset) == {"dexter", "wdc", "music"}
    d = df.set_index("dataset")
    # Paper-shape invariants: Dexter has by far the most ER problems;
    # every dataset has a non-trivial number of matches.
    assert d.loc["dexter", "er_problems"] == 276
    assert d.loc["wdc", "er_problems"] == 12
    assert d.loc["music", "er_problems"] == 20
    assert (df.matches > 0).all()
    assert (df.matches < df.record_pairs).all()
