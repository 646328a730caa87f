"""Execution traces of BSP query runs.

A :class:`Trace` is the *partition-independent* record of a multi-query BSP
execution: which vertices were active in which iteration of which query, and
which vertex-to-vertex messages were sent. In the BSP model the logical
execution is identical under every vertex placement — only timing differs —
so one trace can be re-priced under every partitioning strategy and barrier
model (DESIGN.md §3, "key simulation identity").

Traces are deterministic in (graph seed, workload seed), so they are cached
as parquet under ``.trace_cache/`` and reused by tests, jobs and benchmarks.
"""
from __future__ import annotations

import hashlib
import os
from dataclasses import dataclass

import pandas as pd

CACHE_DIR = os.environ.get(
    "REPRO_TRACE_CACHE", os.path.join(os.path.dirname(__file__), "..", "..", "..", ".trace_cache")
)


@dataclass
class Trace:
    """Record of one multi-query BSP run.

    ``activations``: (qid, iter, vid) — vertex ``vid`` executed the vertex
    function in iteration ``iter`` of query ``qid``.
    ``messages``: (qid, iter, src, dst) — a message sent in iteration
    ``iter`` (from an active ``src`` to neighbour ``dst``).
    ``final``: (qid, vid, dist) — final per-query vertex data.
    """

    activations: pd.DataFrame
    messages: pd.DataFrame
    final: pd.DataFrame

    def iters_per_query(self) -> pd.Series:
        """Number of BSP iterations each query executed (index: qid)."""
        return self.activations.groupby("qid")["iter"].max() + 1

    def global_scope(self, qid: int) -> set[int]:
        """GS(q): all vertices activated by query ``qid`` (paper §2)."""
        a = self.activations
        return set(a.loc[a["qid"] == qid, "vid"].tolist())

    def restrict(self, qids) -> "Trace":
        """Sub-trace containing only the given queries."""
        qs = set(int(q) for q in qids)
        return Trace(
            activations=self.activations[self.activations["qid"].isin(qs)].copy(),
            messages=self.messages[self.messages["qid"].isin(qs)].copy(),
            final=self.final[self.final["qid"].isin(qs)].copy(),
        )

    def save(self, path: str) -> None:
        os.makedirs(path, exist_ok=True)
        self.activations.to_parquet(os.path.join(path, "activations.parquet"))
        self.messages.to_parquet(os.path.join(path, "messages.parquet"))
        self.final.to_parquet(os.path.join(path, "final.parquet"))

    @staticmethod
    def load(path: str) -> "Trace":
        return Trace(
            activations=pd.read_parquet(os.path.join(path, "activations.parquet")),
            messages=pd.read_parquet(os.path.join(path, "messages.parquet")),
            final=pd.read_parquet(os.path.join(path, "final.parquet")),
        )


def workload_key(net, queries) -> str:
    """Cache key derived from graph identity and full query content, so any
    change to generators or workloads invalidates the cached trace."""
    desc = f"{net.name}|{net.seed}|{net.n_vertices}|{net.n_edges}|" + ";".join(
        f"{q.qid},{q.kind},{q.start},{q.end},{q.batch}" for q in queries
    )
    return hashlib.sha256(desc.encode()).hexdigest()


def cached_trace(key: str, builder) -> Trace:
    """Load trace ``key`` from the parquet cache, or build and store it.

    ``builder`` is a zero-arg callable returning a :class:`Trace`. The key is
    hashed so callers can use long descriptive strings.
    """
    h = hashlib.sha256(key.encode()).hexdigest()[:16]
    path = os.path.join(CACHE_DIR, h)
    if os.path.exists(os.path.join(path, "final.parquet")):
        return Trace.load(path)
    t = builder()
    t.save(path)
    return t
