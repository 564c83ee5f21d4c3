"""Benchmark target regenerating Table 5 (ratio_init sweep on Dexter)."""
import pathlib

import pytest

from repro.eval.tables import table5

_OUT = pathlib.Path(__file__).resolve().parent.parent / "results"


@pytest.mark.benchmark(group="table5")
def test_table5_ratio_init(spark, benchmark):
    df = benchmark.pedantic(
        lambda: table5(spark, scale=1.5), rounds=1, iterations=1
    )
    _OUT.mkdir(exist_ok=True)
    df.to_csv(_OUT / "table5_measured.csv", index=False)

    assert len(df) == 12  # 3 budgets x 2 ratios x 2 AL methods
    assert df.f1.between(0, 1).all()
    assert (df.std_f1 >= 0).all()
    # Paper-shape invariant: quality does not collapse at ratio 30 %
    # (the paper's point is that 30 % remains usable, if noisier).
    assert df[df.ratio_init == 0.3].f1.min() > 0.5
