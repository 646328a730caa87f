"""High-level Q-cut solution state (paper §3.2.2 + Appendix A.1).

The state is the controller's scalable representation of global knowledge:
a matrix of local-query-scope sizes ``ls[c, w] = |LS(c, w)|`` for movable
units ``c`` (query clusters, cf. :mod:`repro.core.clustering`) and workers
``w``, plus the per-worker workload ``L_w`` of Appendix A.1
(``L_w = (|V(w)| + Σ_c |LS(c,w)|) / 2``). A move of a local scope updates
``L`` by the scope size ``x`` exactly as Algorithm 2 line 15 does.

Cost function (§3.2.2): for every query, every vertex not on the worker
holding the query's largest local scope costs one unit —
``c_s = Σ_c (Σ_w ls[c,w] − max_w ls[c,w])``. Zero cost ⇔ every query fully
local.
"""
from __future__ import annotations

import numpy as np


class QcutState:
    """Mutable ILS solution state; copy() before speculative edits."""

    def __init__(self, ls: np.ndarray, vcounts: np.ndarray, delta: float):
        ls = np.asarray(ls, dtype=float)
        if ls.ndim != 2:
            raise ValueError("ls must be (clusters x workers)")
        self.ls = ls.copy()
        self.k = ls.shape[1]
        self.delta = float(delta)
        vcounts = np.asarray(vcounts, dtype=float)
        if vcounts.shape != (self.k,):
            raise ValueError("vcounts must have one entry per worker")
        # Appendix A.1 workload; updated incrementally by moves thereafter.
        self.L = (vcounts + ls.sum(axis=0)) / 2.0
        # provenance: for each cluster, where the scope initially at worker
        # w currently lives — needed to emit move(LS(q,w), w, w') requests.
        self.origins: list[dict[int, int]] = [
            {int(w): int(w) for w in np.flatnonzero(ls[c] > 0)}
            for c in range(ls.shape[0])
        ]

    @property
    def n_clusters(self) -> int:
        return self.ls.shape[0]

    def copy(self) -> "QcutState":
        new = object.__new__(QcutState)
        new.ls = self.ls.copy()
        new.k = self.k
        new.delta = self.delta
        new.L = self.L.copy()
        new.origins = [dict(o) for o in self.origins]
        return new

    # ---- cost -------------------------------------------------------------
    def cost(self) -> float:
        """Query-cut cost of §3.2.2 (vertices outside the argmax worker)."""
        if self.ls.size == 0:
            return 0.0
        return float((self.ls.sum(axis=1) - self.ls.max(axis=1)).sum())

    def move_delta(self, c: int, w: int, w2: int) -> float:
        """Cost change if scope (c, w) moved to w2 — O(k), no state copy."""
        row = self.ls[c]
        x = row[w]
        old_mx = row.max()
        new_row = row.copy()
        new_row[w] = 0.0
        new_row[w2] += x
        return float(old_mx - new_row.max())

    # ---- balance (Alg. 2 line 15 / Appendix A.1) ---------------------------
    def move_allowed(self, c: int, w: int, w2: int) -> bool:
        """δ-balance predicate for moving scope (c, w) to w2."""
        if w == w2:
            return False
        x = self.ls[c, w]
        if x <= 0:
            return False
        lw, lw2 = self.L[w] - x, self.L[w2] + x
        m = max(lw, lw2)
        if m <= 0:
            return True
        return abs(lw - lw2) / m < self.delta

    def is_balanced(self) -> bool:
        """All-pairs balance predicate of Appendix A.1."""
        lo, hi = self.L.min(), self.L.max()
        if hi <= 0:
            return True
        return (hi - lo) / hi < self.delta

    # ---- mutation ----------------------------------------------------------
    def move(self, c: int, w: int, w2: int) -> None:
        """Apply move(LS(c,w), w, w2) — merges into any scope already at w2."""
        x = self.ls[c, w]
        if x <= 0 or w == w2:
            return
        self.ls[c, w] = 0.0
        self.ls[c, w2] += x
        self.L[w] -= x
        self.L[w2] += x
        for w_init, cur in self.origins[c].items():
            if cur == w:
                self.origins[c][w_init] = int(w2)

    def spread_clusters(self) -> np.ndarray:
        """Clusters whose scopes span >= 2 workers (perturbation candidates)."""
        return np.flatnonzero((self.ls > 0).sum(axis=1) >= 2)
