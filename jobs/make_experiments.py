"""Regenerate the results tables of EXPERIMENTS.md from results/*.csv.

Usage: ``python jobs/make_experiments.py`` — prints the markdown blocks
(Tables 2, 4, 5, measured vs paper) that EXPERIMENTS.md embeds, so the
document can be refreshed after a bench run.
"""
import pathlib

import pandas as pd

RES = pathlib.Path(__file__).resolve().parent.parent / "results"


def table2_md() -> str:
    df = pd.read_csv(RES / "table2_measured.csv")
    lines = [
        "| dataset | ER problems (ours / paper) | record pairs (ours / paper) | matches (ours / paper) |",
        "|---|---|---|---|",
    ]
    for _, r in df.iterrows():
        lines.append(
            f"| {r.dataset} | {r.er_problems} / {r.paper_er_problems} "
            f"| {r.record_pairs:,} / {r.paper_record_pairs:,} "
            f"| {r.matches:,} / {r.paper_matches:,} |"
        )
    return "\n".join(lines)


def table4_md() -> str:
    df = pd.read_csv(RES / "table4_speedups.csv")
    order = ["almser", "transer_all", "transer_50", "sudowoodo",
             "ditto_all", "ditto_50", "anymatch"]
    out = []
    for variant in ("morer_almser", "morer_bootstrap"):
        out.append(f"\n**{variant}** (each cell: measured× / paper×)\n")
        out.append("| dataset | budget | " + " | ".join(order) + " |")
        out.append("|---|---|" + "---|" * len(order))
        sub = df[df.variant == variant]
        for ds in ("dexter", "music", "wdc"):
            for pb in (1000, 1500, 2000):
                row = sub[(sub.dataset == ds) & (sub.paper_budget == pb)]
                cells = []
                for b in order:
                    r = row[row.baseline == b]
                    cells.append(
                        f"{r.speedup.iloc[0]:.1f} / {r.paper_speedup.iloc[0]:.1f}"
                        if len(r) else "-"
                    )
                out.append(f"| {ds} | {pb} | " + " | ".join(cells) + " |")
    return "\n".join(out)


def table4_f1_md() -> str:
    raw = pd.read_csv(RES / "table4_raw.csv")
    piv = raw.groupby(["method", "dataset"]).agg(
        f1=("f1", "mean"), t=("total_time_s", "mean")
    )
    lines = ["| method | dexter F1 / s | music F1 / s | wdc F1 / s |", "|---|---|---|---|"]
    for m in sorted(raw.method.unique()):
        cells = []
        for ds in ("dexter", "music", "wdc"):
            r = piv.loc[(m, ds)]
            cells.append(f"{r.f1:.3f} / {r.t:.1f}")
        lines.append(f"| {m} | " + " | ".join(cells) + " |")
    return "\n".join(lines)


def table5_md() -> str:
    df = pd.read_csv(RES / "table5_measured.csv")
    lines = [
        "| budget (paper/ours) | ratio_init | AL | F1 ours | std ours | F1 paper | std paper |",
        "|---|---|---|---|---|---|---|",
    ]
    for _, r in df.sort_values(["paper_budget", "ratio_init", "al"]).iterrows():
        lines.append(
            f"| {r.paper_budget}/{r.budget} | {int(r.ratio_init*100)}% | {r.al} "
            f"| {r.f1:.3f} | {r.std_f1:.3f} | {r.paper_f1:.3f} | {r.paper_std_f1:.3f} |"
        )
    return "\n".join(lines)


if __name__ == "__main__":
    print("## Table 2\n")
    print(table2_md())
    print("\n## Table 4\n")
    print(table4_md())
    print("\n## Fig 5/6 raw (per-method quality & runtime)\n")
    print(table4_f1_md())
    print("\n## Table 5\n")
    print(table5_md())
