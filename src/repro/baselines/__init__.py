"""Comparator algorithms from the paper's evaluation (§6.1).

- ``ateuc``    — the non-adaptive seed-minimization state of the art
  [Han et al. 2017], rebuilt from this paper's description (closed
  source; see DESIGN.md §3 for the reconstruction).
- ``adaptim``  — ADAPTIM-1 [Han et al. 2018] modified for seed
  minimization: the ASTI loop but greedily maximizing *untruncated*
  marginal spread with single-root RR sets.
"""
from repro.baselines.adaptim import adaptim
from repro.baselines.ateuc import AteucResult, ateuc

__all__ = ["adaptim", "ateuc", "AteucResult"]
