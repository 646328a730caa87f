"""Adaptivity policy (paper §3.4): the monitor/analyze half of the MAPE loop.

The controller keeps query statistics for a tumbling monitoring window μ —
here expressed in *batches* (a batch of 16 parallel queries is the unit of
arrival), capped at the paper's 128 queries. It triggers repartitioning
when the window's average query locality drops below Φ = 0.7, or when the
window's workload imbalance exceeds the allowed δ — the paper's Q-cut
"always ensures workload balance under dynamic query workload" (§4.2,
Fig. 6e): balance violations make the current partitioning suboptimal just
as locality violations do. A cooldown of one batch prevents thrashing.
"""
from __future__ import annotations

from dataclasses import dataclass, field

import numpy as np
import pandas as pd


@dataclass
class AdaptivityParams:
    phi: float = 0.7              # locality threshold Φ (paper: 0.7)
    delta: float = 0.25           # allowed imbalance δ (paper: 0.25)
    imbalance_trigger: float = 0.5  # repartition when window imbalance
                                  # exceeds this (2δ): δ bounds what the ILS
                                  # may *produce*; the trigger only fires on
                                  # imbalance Q-cut could actually repair —
                                  # hotspot structure puts the achievable
                                  # floor above δ itself
    window_batches: int = 6       # monitoring window μ in batches (≤96
                                  # queries — "a few dozen", capped below)
    max_window_queries: int = 128 # paper's query cap inside the window
    cooldown_batches: int = 0     # extra batches between repartitionings
                                  # (0: at most every other batch)
    min_window_queries: int = 48  # don't run Q-cut before the window holds
                                  # "a few dozen queries" (paper §4.1 iii)


@dataclass
class AdaptiveController:
    """Collects per-batch observations and decides when to repartition."""

    params: AdaptivityParams = field(default_factory=AdaptivityParams)
    _locality: list[pd.DataFrame] = field(default_factory=list)  # per batch
    _worker_totals: dict[int, "np.ndarray"] = field(default_factory=dict)
    _last_repartition: int = -10**9

    def observe_batch(self, batch: int, locality: pd.Series, worker_totals) -> None:
        """Record the stats piggybacked on this batch's barrier messages:
        per-query locality and per-worker active-vertex workload totals."""
        self._locality.append(
            pd.DataFrame({"batch": batch, "qid": locality.index, "locality": locality.values})
        )
        self._worker_totals[batch] = np.asarray(worker_totals, dtype=float)

    def window_qids(self, batch: int) -> list[int]:
        """Queries inside the monitoring window ending at ``batch``."""
        lo = batch - self.params.window_batches + 1
        rows = pd.concat(self._locality, ignore_index=True) if self._locality else pd.DataFrame(
            columns=["batch", "qid", "locality"]
        )
        w = rows[rows["batch"].between(lo, batch)]
        qids = w.sort_values("batch", ascending=False)["qid"].tolist()
        return [int(q) for q in qids[: self.params.max_window_queries]]

    def window_locality(self, batch: int) -> float:
        if not self._locality:
            return 1.0  # no stats yet: nothing to react to
        lo = batch - self.params.window_batches + 1
        rows = pd.concat(self._locality, ignore_index=True)
        w = rows[rows["batch"].between(lo, batch)]
        return float(w["locality"].mean()) if len(w) else 1.0

    def window_imbalance(self, batch: int) -> float:
        """Relative deviation of per-worker workload summed over the window
        (the paper's 60 s workload window, Fig. 6e) — summing first removes
        the sampling noise of a single 16-query batch."""
        lo = batch - self.params.window_batches + 1
        mats = [v for b, v in self._worker_totals.items() if lo <= b <= batch]
        if not mats:
            return 0.0
        totals = np.sum(mats, axis=0)
        if totals.sum() <= 0:
            return 0.0
        return float(np.abs(totals - totals.mean()).mean() / totals.mean())

    def should_repartition(self, batch: int) -> bool:
        if batch - self._last_repartition <= self.params.cooldown_batches:
            return False
        if len(self.window_qids(batch)) < self.params.min_window_queries:
            return False
        return (
            self.window_locality(batch) < self.params.phi
            or self.window_imbalance(batch) >= self.params.imbalance_trigger
        )

    def repartitioned(self, batch: int) -> None:
        self._last_repartition = batch
