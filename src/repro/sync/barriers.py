"""Hybrid vs global barrier synchronization — tick-based latency simulation.

One *tick* i means "every live query of the batch executes its iteration i";
queries of a batch start together (paper: batches of 16 parallel queries).
Worker load per tick sums over *all* co-located queries — this models the
contention/straggler coupling the paper discusses (e.g. the Berlin worker).

Barrier modes (paper §3.3):

* ``hybrid``  — per-query *limited* barriers spanning only the workers the
  query currently touches; a single-worker group is a *local* barrier and
  costs nothing. Iteration duration of query q =
  ``max_{w in group(q,i)} L[w,i] + barrier(|group|)``.
* ``global``  — the state-of-the-art baseline [Xue et al. 44]: every query
  synchronizes across *all* k workers after every iteration. Duration =
  ``max_w L[w,i] + barrier(k)`` regardless of where q actually runs.

Latency(q) = Σ over q's live ticks (plus the per-iteration floor); this is
exactly the paper's query-latency definition (last minus first activation
time) under the simulated clock.

:func:`simulate_batch_switch` prices a batch whose vertex assignment changes
at a *global STOP/START barrier* mid-execution (paper §3.3 phase 3 + §3.4):
ticks before the switch are priced under the old assignment, ticks after
under the new one, and every query live at the switch pays the global
barrier plus the vertex-shipping overhead.
"""
from __future__ import annotations

from dataclasses import dataclass
from typing import Literal

import numpy as np
import pandas as pd

from repro.cluster.costmodel import CostModel

BarrierMode = Literal["hybrid", "global"]


@dataclass
class BatchSimResult:
    """Simulated execution of one batch of parallel queries."""

    latencies: pd.Series        # qid -> simulated query latency
    locality: pd.Series         # qid -> fraction of fully-local iterations
    imbalance: float            # mean relative deviation of active-vertex load
    worker_active: np.ndarray   # (k, T) active vertices per worker per tick
    group_sizes: pd.DataFrame   # (qid, iter, group_size)

    @property
    def avg_latency(self) -> float:
        return float(self.latencies.mean())

    @property
    def sum_latency(self) -> float:
        return float(self.latencies.sum())

    @property
    def avg_locality(self) -> float:
        return float(self.locality.mean())

    @property
    def worker_totals(self) -> np.ndarray:
        """Active vertices per worker summed over the batch (workload)."""
        return self.worker_active.sum(axis=1)


def _price(
    ac: pd.DataFrame,
    mc: pd.DataFrame,
    qids: np.ndarray,
    *,
    k: int,
    cost: CostModel,
    mode: BarrierMode,
) -> tuple[np.ndarray, np.ndarray, np.ndarray]:
    """Tick-level pricing for fixed ``qids``: (dur, group_size, AV).

    ``dur``/``group_size``: (n_queries, T); ``AV``: (k, T) active vertices.
    Ticks where a query is finished have dur 0 and group_size 0.
    """
    qidx = {int(q): i for i, q in enumerate(qids)}
    nq = len(qids)
    T = int(ac["iter"].max()) + 1

    # ---- per-worker per-tick load L and active-vertex counts AV ----------
    L = np.zeros((k, T))
    AV = np.zeros((k, T))
    aw = ac["worker"].to_numpy()
    ai = ac["iter"].to_numpy()
    an = ac["n_active"].to_numpy(dtype=float)
    np.add.at(L, (aw, ai), cost.comp_per_vertex * an)
    np.add.at(AV, (aw, ai), an)

    part = np.zeros((nq, T, k), dtype=bool)
    aq = np.fromiter((qidx[int(q)] for q in ac["qid"]), dtype=np.int64, count=len(ac))
    part[aq, ai, aw] = True

    if not mc.empty:
        ws = mc["w_src"].to_numpy()
        wd = mc["w_dst"].to_numpy()
        mi = mc["iter"].to_numpy()
        mn = mc["n_msgs"].to_numpy(dtype=float)
        local = ws == wd
        np.add.at(L, (ws[local], mi[local]), cost.msg_local * mn[local])
        remote = ~local
        half = cost.remote_cost(k) / 2.0
        np.add.at(L, (ws[remote], mi[remote]), half * mn[remote])
        np.add.at(L, (wd[remote], mi[remote]), half * mn[remote])
        mq = np.fromiter((qidx[int(q)] for q in mc["qid"]), dtype=np.int64, count=len(mc))
        part[mq, mi, ws] = True
        part[mq, mi, wd] = True

    group_size = part.sum(axis=2)  # (nq, T)
    live = group_size > 0

    # ---- durations per query per tick -------------------------------------
    if mode == "hybrid":
        masked = np.where(part, L.T[None, :, :], -np.inf)
        work = masked.max(axis=2)
        work[~live] = 0.0
        barrier = np.array([cost.barrier_cost(g) for g in range(k + 1)])
        dur = work + barrier[np.minimum(group_size, k)] + cost.iter_floor
    elif mode == "global":
        tick = L.max(axis=0) + cost.barrier_cost(k) + cost.iter_floor
        dur = np.broadcast_to(tick, (nq, T)).copy()
    else:
        raise ValueError(f"unknown barrier mode {mode!r}")
    dur[~live] = 0.0
    return dur, group_size, AV


def _result(
    qids: np.ndarray, dur: np.ndarray, group_size: np.ndarray, AV: np.ndarray
) -> BatchSimResult:
    live = group_size > 0
    latencies = pd.Series(dur.sum(axis=1), index=pd.Index(qids, name="qid"))
    loc = (group_size == 1).sum(axis=1) / np.maximum(live.sum(axis=1), 1)
    locality = pd.Series(loc, index=pd.Index(qids, name="qid"))

    # Paper Fig. 6e: workload = active vertices per worker in a time window
    # (60 s there, one batch here); imbalance = mean relative deviation of
    # the per-worker totals from the average.
    totals = AV.sum(axis=1)
    imbalance = (
        float(np.abs(totals - totals.mean()).mean() / totals.mean())
        if totals.sum() > 0
        else 0.0
    )

    gq, gt = np.nonzero(live)
    group_sizes = pd.DataFrame(
        {"qid": qids[gq], "iter": gt, "group_size": group_size[gq, gt]}
    )
    return BatchSimResult(
        latencies=latencies,
        locality=locality,
        imbalance=imbalance,
        worker_active=AV,
        group_sizes=group_sizes,
    )


def simulate_batch(
    ac: pd.DataFrame,
    mc: pd.DataFrame,
    *,
    k: int,
    cost: CostModel,
    mode: BarrierMode = "hybrid",
) -> BatchSimResult:
    """Price one batch under one barrier mode and one fixed assignment.

    ``ac``: (qid, iter, worker, n_active) — active-vertex counts, restricted
    to the batch's queries. ``mc``: (qid, iter, w_src, w_dst, n_msgs).
    """
    if ac.empty:
        raise ValueError("batch has no activations")
    qids = np.sort(ac["qid"].unique())
    dur, group_size, AV = _price(ac, mc, qids, k=k, cost=cost, mode=mode)
    return _result(qids, dur, group_size, AV)


def simulate_batch_switch(
    ac_before: pd.DataFrame,
    mc_before: pd.DataFrame,
    ac_after: pd.DataFrame,
    mc_after: pd.DataFrame,
    *,
    switch_tick: int,
    switch_overhead: float,
    k: int,
    cost: CostModel,
    mode: BarrierMode = "hybrid",
) -> BatchSimResult:
    """Price one batch whose assignment changes at ``switch_tick``.

    Ticks < ``switch_tick`` use the *before* tables, ticks >= use *after*.
    Every query still live at the switch additionally pays
    ``switch_overhead`` (the global STOP/START barrier + vertex shipping).
    """
    if ac_before.empty:
        raise ValueError("batch has no activations")
    qids = np.sort(ac_before["qid"].unique())
    dur_b, gs_b, av_b = _price(ac_before, mc_before, qids, k=k, cost=cost, mode=mode)
    dur_a, gs_a, av_a = _price(ac_after, mc_after, qids, k=k, cost=cost, mode=mode)
    T = dur_b.shape[1]
    s = int(min(max(switch_tick, 0), T))
    dur = np.concatenate([dur_b[:, :s], dur_a[:, s:]], axis=1)
    group_size = np.concatenate([gs_b[:, :s], gs_a[:, s:]], axis=1)
    AV = np.concatenate([av_b[:, :s], av_a[:, s:]], axis=1)
    live_at_switch = (gs_b[:, s:] > 0).any(axis=1) if s < T else np.zeros(len(qids), bool)
    dur[live_at_switch, s if s < T else T - 1] += switch_overhead
    return _result(qids, dur, group_size, AV)
