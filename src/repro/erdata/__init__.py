"""Multi-source ER data substrate.

The paper evaluates on Dexter (SIGMOD'20 cameras), WDC-computer and
MusicBrainz — none of which are downloadable offline — so this package
generates synthetic equivalents ("-lite") that preserve the properties
MoRER depends on (see DESIGN.md §2):

* several data sources drawn from one shared entity universe, so ER
  problems (source pairs) have real matches;
* per-source corruption *profiles* drawn from a few archetypes, so the
  per-problem similarity-feature distributions differ by source pair in
  a clustered way (what MoRER's distribution analysis discovers);
* model-number near-miss non-matches (the Dexter difficulty);
* intra-source duplicates for dexter-lite (self ER problems included,
  giving 23 sources -> 276 problems as in Table 2).

Pair generation (token blocking + similarity features) is a Spark job —
the quadratic part of the workload stays in the dataflow layer.
"""
from repro.erdata.sources import DATASETS, DatasetSpec, make_records
from repro.erdata.features import pair_features
from repro.erdata.splits import build_problems

__all__ = [
    "DATASETS",
    "DatasetSpec",
    "make_records",
    "pair_features",
    "build_problems",
]
