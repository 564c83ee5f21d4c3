"""Table 5 — F1 +- std for ratio_init 30 % vs 50 % on Dexter.

Usage: ``python jobs/table5_ratio_init.py [out_csv]``
"""
import sys

from _session import BENCH_SCALE, get_spark


def main() -> None:
    out = sys.argv[1] if len(sys.argv) > 1 else "table5.csv"
    spark = get_spark("table5")
    from repro.eval.tables import table5

    df = table5(spark, scale=BENCH_SCALE["dexter"])
    df.to_csv(out, index=False)
    print("\nTable 5 (measured vs paper):")
    print(df.to_string(index=False))
    spark.stop()


if __name__ == "__main__":
    main()
