"""Baseline methods the paper compares MoRER against (§5.2).

Each baseline returns a :class:`repro.baselines.common.BaselineResult`
with timed model-generation and Spark-side classification phases, so
the Table 4 speedup harness treats every method identically. The
language-model baselines (Ditto, Sudowoodo, MultiEM, AnyMatch) are
offline proxies — see DESIGN.md §2 for what each substitution
preserves (training-data regime, cost shape, failure mode).
"""
from repro.baselines.common import BaselineResult
from repro.baselines.almser_standalone import run_almser_standalone
from repro.baselines.transer import run_transer
from repro.baselines.ditto_proxy import run_ditto
from repro.baselines.sudowoodo_proxy import run_sudowoodo
from repro.baselines.multiem_proxy import run_multiem
from repro.baselines.anymatch_proxy import run_anymatch

__all__ = [
    "BaselineResult",
    "run_almser_standalone",
    "run_transer",
    "run_ditto",
    "run_sudowoodo",
    "run_multiem",
    "run_anymatch",
]
