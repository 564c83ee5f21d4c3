"""Fig. 7-style sweep — distribution tests (KS / WD / PSI) x AL method.

Backs the paper's RQ3 and the Table 3 default (test=KS).
Usage: ``python jobs/dist_tests.py [out_csv]``
"""
import sys

from _session import BENCH_SCALE, get_spark


def main() -> None:
    out = sys.argv[1] if len(sys.argv) > 1 else "dist_tests.csv"
    spark = get_spark("dist_tests")
    import pandas as pd

    from repro.erdata import build_problems
    from repro.eval.harness import run_method

    rows = []
    for ds, scale in BENCH_SCALE.items():
        su = build_problems(spark, ds, scale=scale, seed=0)
        for test in ("ks", "wd", "psi"):
            for al in ("bootstrap", "almser"):
                r = run_method(
                    spark, su, f"morer_{al}", budget=400,
                    morer_overrides={"test": test},
                )
                rows.append(
                    {"dataset": ds, "test": test, "al": al,
                     "f1": r.f1, "total_time_s": r.total_time}
                )
                print(rows[-1], flush=True)
        su.pairs.unpersist()
    pd.DataFrame(rows).to_csv(out, index=False)
    spark.stop()


if __name__ == "__main__":
    main()
