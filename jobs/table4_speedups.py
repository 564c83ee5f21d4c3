"""Table 4 — speedups of MoRER over all baselines (+ Fig. 5/6 raw data).

Usage: ``python jobs/table4_speedups.py [out_prefix]``

Writes ``<out_prefix>_speedups.csv`` and ``<out_prefix>_raw.csv`` and
prints the speedup matrix in the paper's layout.
"""
import sys

from _session import BENCH_SCALE, get_spark


def main() -> None:
    out = sys.argv[1] if len(sys.argv) > 1 else "table4"
    spark = get_spark("table4")
    from repro.eval.tables import TABLE4_BASELINES, table4

    frames = []
    raws = []
    for ds, scale in BENCH_SCALE.items():
        sp, raw = table4(spark, scale=scale, datasets=(ds,))
        frames.append(sp)
        raws.append(raw)
    import pandas as pd

    speed = pd.concat(frames, ignore_index=True)
    raw = pd.concat(raws, ignore_index=True)
    speed.to_csv(f"{out}_speedups.csv", index=False)
    raw.to_csv(f"{out}_raw.csv", index=False)

    for variant in ("morer_almser", "morer_bootstrap"):
        print(f"\n=== Table 4 block: {variant} (measured | paper) ===")
        for ds in BENCH_SCALE:
            for pb in sorted(speed["paper_budget"].unique()):
                row = speed[
                    (speed.variant == variant)
                    & (speed.dataset == ds)
                    & (speed.paper_budget == pb)
                ]
                cells = []
                for b in TABLE4_BASELINES:
                    r = row[row.baseline == b]
                    if len(r):
                        cells.append(
                            f"{b}={r.speedup.iloc[0]:.1f}|{r.paper_speedup.iloc[0]}"
                        )
                print(f"{ds:7s} b={pb}: " + "  ".join(cells))
    spark.stop()


if __name__ == "__main__":
    main()
