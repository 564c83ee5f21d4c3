"""Table 2 — dataset statistics (measured vs paper).

Usage: ``python jobs/table2_stats.py [scale]``
"""
import sys

from _session import get_spark


def main() -> None:
    scale = float(sys.argv[1]) if len(sys.argv) > 1 else 1.0
    spark = get_spark("table2")
    from repro.eval.tables import table2

    df = table2(spark, scale=scale)
    print(f"\nTable 2 (scale={scale}):")
    print(df.to_string(index=False))
    spark.stop()


if __name__ == "__main__":
    main()
