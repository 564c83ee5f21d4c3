"""Fig. 8-style sweep — sel_base vs sel_cov with t_cov in {0.1,0.25,0.5}.

Backs the paper's §5.6 (Bootstrap AL, b=1000 -> 400 here).
Usage: ``python jobs/selection_sweep.py [out_csv]``
"""
import sys

from _session import BENCH_SCALE, get_spark


def main() -> None:
    out = sys.argv[1] if len(sys.argv) > 1 else "selection_sweep.csv"
    spark = get_spark("selection_sweep")
    import pandas as pd

    from repro.erdata import build_problems
    from repro.eval.harness import run_method

    rows = []
    for ds, scale in BENCH_SCALE.items():
        su = build_problems(spark, ds, scale=scale, seed=0)
        configs = [("base", None)] + [("cov", t) for t in (0.1, 0.25, 0.5)]
        for sel, t_cov in configs:
            overrides = {"selection": sel}
            if t_cov is not None:
                overrides["t_cov"] = t_cov
            r = run_method(
                spark, su, "morer_bootstrap", budget=400,
                morer_overrides=overrides,
            )
            rows.append(
                {"dataset": ds, "selection": sel, "t_cov": t_cov,
                 "f1": r.f1, "labels": r.labels_spent,
                 "total_time_s": r.total_time}
            )
            print(rows[-1], flush=True)
        su.pairs.unpersist()
    pd.DataFrame(rows).to_csv(out, index=False)
    spark.stop()


if __name__ == "__main__":
    main()
