"""Comparison systems the paper evaluates against.

- :mod:`repro.baselines.gs_index_seq` — a faithful single-threaded
  GS*-Index (the authors' C++ code is unavailable; this pure-Python
  reference is both the sequential timing baseline of Figure 5/6/7 and
  the correctness reference for differential tests).
- :mod:`repro.baselines.pscan` — a ppSCAN-style per-query SCAN in
  Spark: no index, similarity computation per query with pSCAN/ppSCAN
  degree-bound pruning.
"""
from repro.baselines.gs_index_seq import SequentialGSIndex
from repro.baselines.pscan import pscan_query

__all__ = ["SequentialGSIndex", "pscan_query"]
