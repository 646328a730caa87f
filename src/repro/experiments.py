"""Table-level experiment definitions (paper Section 4 → tables T1–T10).

Each ``table_tNN`` function reproduces the numbers behind one evaluation
figure of the paper (DESIGN.md §4 maps figures to tables) and returns a
:class:`TableResult` whose ``rows`` are the measured counterparts of the
numbers the paper reports. ``jobs/`` wraps these for spark-submit and
``benchmarks/`` wraps them for pytest-benchmark; EXPERIMENTS.md records
paper-vs-measured values.

Workloads and traces are deterministic and disk-cached (one BSP execution
per workload, re-priced under every configuration — DESIGN.md §3).
"""
from __future__ import annotations

from dataclasses import dataclass, field

import numpy as np
import pandas as pd
from pyspark.sql import SparkSession

from repro.cluster.costmodel import C1, M1, M2
from repro.controller.adaptivity import AdaptivityParams
from repro.controller.simulator import ExperimentConfig, ExperimentResult, run_experiment
from repro.core.qcut import QcutInput, run_qcut
from repro.engine import cached_trace, run_queries
from repro.engine.trace import Trace, workload_key
from repro.controller.stats import TraceStats
from repro.queries.workload import Query, hotspot_queries
from repro.roadnet.datasets import bw_lite, edges_df, gy_lite
from repro.roadnet.generator import RoadNetwork

N_MAIN = 384          # paper: 2048 queries; scaled (see DESIGN.md §2)
N_DISTURB = 128       # paper: 496 inter-urban disturbance queries
N_BARRIER = 64        # paper Fig. 6d: 64 SSSP queries
N_SCALE = 128         # paper Fig. 7: 1024 queries
BATCH = 16            # paper: 16 parallel queries per batch


@dataclass
class TableResult:
    """Measured reproduction of one paper table/figure."""

    table: str
    title: str
    rows: pd.DataFrame
    notes: str = ""
    extras: dict = field(default_factory=dict)

    def show(self) -> str:
        head = f"== {self.table}: {self.title} =="
        body = self.rows.to_string(index=False)
        return "\n".join([head, body] + ([f"note: {self.notes}"] if self.notes else []))


# --------------------------------------------------------------------------
# workloads and traces
# --------------------------------------------------------------------------

def sssp_workload(net: RoadNetwork, *, seed: int, n: int = N_MAIN,
                  disturb: int = 0, disturb_seed: int | None = None) -> list[Query]:
    """Hotspot SSSP workload; optionally followed by the Fig. 5 disturbance
    phase (inter-urban queries between random neighboring cities)."""
    qs = hotspot_queries(net, n_queries=n, batch_size=BATCH, seed=seed)
    if disturb:
        qs += hotspot_queries(
            net, n_queries=disturb, batch_size=BATCH, inter_urban=True,
            seed=(disturb_seed if disturb_seed is not None else seed + 10),
            qid_offset=n, batch_offset=n // BATCH,
        )
    return qs


def poi_workload(net: RoadNetwork, *, seed: int, n: int = N_MAIN) -> list[Query]:
    return hotspot_queries(net, n_queries=n, batch_size=BATCH, kind="poi", seed=seed)


def trace_for(spark: SparkSession, net: RoadNetwork, queries: list[Query],
              *, max_iters: int = 150) -> Trace:
    """Disk-cached BSP trace of a workload (one Spark execution per key)."""
    return cached_trace(
        workload_key(net, queries),
        lambda: run_queries(spark, edges_df(spark, net), queries, net, max_iters=max_iters),
    )


def _main_bundle(spark, net, *, seed):
    """Full Fig-5 workload (intra phase + disturbance) and its trace.

    Queries are logically independent, so the phase-1 sub-trace is identical
    whether or not the disturbance queries exist — T3/T7/T8 reuse the full
    trace restricted to phase 1 instead of tracing a second workload.
    """
    queries = sssp_workload(net, seed=seed, disturb=N_DISTURB)
    trace = trace_for(spark, net, queries)
    phase1 = [q for q in queries if q.batch < N_MAIN // BATCH]
    return queries, trace, phase1, trace.restrict([q.qid for q in phase1])


def _strategies(k: int, cost, *, seed: int = 0) -> dict[str, ExperimentConfig]:
    return {
        "hash": ExperimentConfig(k=k, initial="hash", cost=cost, seed=seed),
        "domain": ExperimentConfig(k=k, initial="domain", cost=cost, seed=seed),
        "qcut+hash": ExperimentConfig(
            k=k, initial="hash", adaptive=True, cost=cost, seed=seed),
        "qcut+domain": ExperimentConfig(
            k=k, initial="domain", adaptive=True, cost=cost, seed=seed),
    }


def _run_all(spark, net, queries, trace, configs) -> dict[str, ExperimentResult]:
    return {name: run_experiment(spark, net, queries, trace, cfg)
            for name, cfg in configs.items()}


# --------------------------------------------------------------------------
# T1 / T2 — Fig. 5a/5b: adaptive Q-cut over time with disturbance
# --------------------------------------------------------------------------

def _adaptive_over_time(spark, net, *, seed) -> TableResult:
    queries, trace, _, _ = _main_bundle(spark, net, seed=seed)
    res = _run_all(spark, net, queries, trace, _strategies(8, M2, seed=seed))
    hash_lat = res["hash"].per_batch.set_index("batch")["avg_latency"]
    rows = []
    for name, r in res.items():
        pb = r.per_batch.set_index("batch")
        for b in pb.index:
            rows.append({
                "strategy": name,
                "batch": int(b),
                "phase": "intra" if b < N_MAIN // BATCH else "disturb",
                "avg_latency": pb.loc[b, "avg_latency"],
                "normalized_vs_hash": pb.loc[b, "avg_latency"] / hash_lat.loc[b],
                "locality": pb.loc[b, "avg_locality"],
                "repartitioned": bool(pb.loc[b, "repartitioned"]),
            })
    df = pd.DataFrame(rows)
    best = {
        name: 1.0 - df[(df.strategy == name) & (df.batch >= 6)]["normalized_vs_hash"].min()
        for name in res
    }
    summary = pd.DataFrame(
        {"strategy": list(best), "best_batch_reduction_vs_hash": list(best.values())}
    )
    return TableResult(
        table="", title="", rows=df,
        extras={"summary": summary, "results": res},
    )


def table_t01(spark: SparkSession) -> TableResult:
    """Fig. 5a — BW, SSSP, k=8, M2, disturbance to inter-urban.

    Paper: Q-cut reduces avg latency by up to 49% vs static Hash and up to
    40% vs static Domain (phase 1); improvements persist after the
    disturbance."""
    t = _adaptive_over_time(spark, bw_lite(), seed=42)
    t.table, t.title = "T1", "Fig 5a: adaptive Q-cut over time (BW, SSSP)"
    return t


def table_t02(spark: SparkSession) -> TableResult:
    """Fig. 5b — GY, SSSP. Paper: up to 45% vs Hash, 30% vs Domain; Hash
    relatively better than on BW (workload balance matters more)."""
    t = _adaptive_over_time(spark, gy_lite(), seed=43)
    t.table, t.title = "T2", "Fig 5b: adaptive Q-cut over time (GY, SSSP)"
    return t


# --------------------------------------------------------------------------
# T3 / T4 / T5 — Fig. 6a/6b/6c: summed latency
# --------------------------------------------------------------------------

def _summed_latency(spark, net, queries, *, title, table, paper_note,
                    trace=None) -> TableResult:
    if trace is None:
        trace = trace_for(spark, net, queries)
    res = _run_all(spark, net, queries, trace, _strategies(8, M2))
    rows = pd.DataFrame(
        [
            {
                "strategy": name,
                "total_latency": r.total_latency,
                "vs_hash": r.total_latency / res["hash"].total_latency,
                "vs_domain": r.total_latency / res["domain"].total_latency,
                "locality_tail": float(r.per_batch["avg_locality"].tail(8).mean()),
                "imbalance_tail": float(r.per_batch["imbalance_window"].tail(8).mean()),
            }
            for name, r in res.items()
        ]
    )
    return TableResult(table=table, title=title, rows=rows, notes=paper_note,
                       extras={"results": res})


def table_t03(spark: SparkSession) -> TableResult:
    net = bw_lite()
    _, _, phase1, trace1 = _main_bundle(spark, net, seed=42)
    t = _summed_latency(
        spark, net, phase1, trace=trace1,
        table="T3", title="Fig 6a: summed latency, SSSP on BW",
        paper_note="paper: Q-cut -43% vs Hash, -22% vs Domain; LDG was "
                   "excluded by the paper for 2-6x worse latency (imbalance) "
                   "— measured here for completeness",
    )
    # the paper's excluded LDG baseline (§4.1 "Initial Partitioning")
    ldg = run_experiment(
        spark, net, phase1, trace1, ExperimentConfig(k=8, initial="ldg", cost=M2)
    )
    hash_total = float(
        t.rows.loc[t.rows["strategy"] == "hash", "total_latency"].iloc[0]
    )
    domain_total = float(
        t.rows.loc[t.rows["strategy"] == "domain", "total_latency"].iloc[0]
    )
    t.rows = pd.concat(
        [
            t.rows,
            pd.DataFrame(
                [{
                    "strategy": "ldg (paper-excluded)",
                    "total_latency": ldg.total_latency,
                    "vs_hash": ldg.total_latency / hash_total,
                    "vs_domain": ldg.total_latency / domain_total,
                    "locality_tail": float(ldg.per_batch["avg_locality"].tail(8).mean()),
                    "imbalance_tail": float(ldg.per_batch["imbalance_window"].tail(8).mean()),
                }]
            ),
        ],
        ignore_index=True,
    )
    return t


def table_t04(spark: SparkSession) -> TableResult:
    net = gy_lite()
    _, _, phase1, trace1 = _main_bundle(spark, net, seed=43)
    return _summed_latency(
        spark, net, phase1, trace=trace1,
        table="T4", title="Fig 6b: summed latency, SSSP on GY",
        paper_note="paper: Q-cut -13% vs Hash, -25% vs Domain (Hash beats Domain)",
    )


def table_t05(spark: SparkSession) -> TableResult:
    net = bw_lite()
    return _summed_latency(
        spark, net, poi_workload(net, seed=44),
        table="T5", title="Fig 6c: summed latency, POI on BW",
        paper_note="paper: Q-cut -50% vs Hash, -28% vs Domain",
    )


# --------------------------------------------------------------------------
# T6 — Fig. 6d: hybrid vs traditional (global) barrier synchronization
# --------------------------------------------------------------------------

def table_t06(spark: SparkSession) -> TableResult:
    """64 SSSP queries on BW, k=8, infrastructure M1 (paper Fig. 6d).

    Paper: Domain is 1.7–2.4x faster than Hash; hybrid barriers are
    1.2–1.7x faster than traditional global barriers for both."""
    net = bw_lite()
    queries = sssp_workload(net, seed=45, n=N_BARRIER)
    trace = trace_for(spark, net, queries)
    totals = {}
    for initial in ("hash", "domain"):
        for barrier in ("global", "hybrid"):
            cfg = ExperimentConfig(k=8, initial=initial, barrier=barrier, cost=M1)
            totals[(initial, barrier)] = run_experiment(
                spark, net, queries, trace, cfg
            ).total_latency
    rows = pd.DataFrame(
        [
            {"partitioning": i, "barrier": b, "total_latency": v}
            for (i, b), v in totals.items()
        ]
    )
    rows["speedup_hybrid"] = rows.apply(
        lambda r: totals[(r.partitioning, "global")] / totals[(r.partitioning, "hybrid")],
        axis=1,
    )
    return TableResult(
        table="T6", title="Fig 6d: hybrid vs global barrier (BW, 64 SSSP, M1)",
        rows=rows,
        notes="paper: hybrid 1.2-1.7x faster; Domain 1.7-2.4x faster than Hash",
    )


# --------------------------------------------------------------------------
# T7 / T8 — Fig. 6e/6f: workload imbalance and query locality over time
# --------------------------------------------------------------------------

def _metric_over_time(spark, column, *, table, title, note) -> TableResult:
    net = bw_lite()
    _, _, queries, trace = _main_bundle(spark, net, seed=42)
    res = _run_all(spark, net, queries, trace, _strategies(8, M2))
    rows = []
    for name, r in res.items():
        pb = r.per_batch
        for _, row in pb.iterrows():
            rows.append({"strategy": name, "batch": int(row["batch"]),
                         column: float(row[column])})
    df = pd.DataFrame(rows)
    tail = df[df.batch >= df.batch.max() - 7].groupby("strategy")[column].mean()
    summary = tail.rename("tail_mean").reset_index()
    return TableResult(table=table, title=title, rows=df, notes=note,
                       extras={"summary": summary})


def table_t07(spark: SparkSession) -> TableResult:
    return _metric_over_time(
        spark, "imbalance_window",
        table="T7", title="Fig 6e: workload imbalance over time (BW, SSSP)",
        note="paper: Domain high, Hash balanced, Q-cut converges to ~20% (delta=0.25)",
    )


def table_t08(spark: SparkSession) -> TableResult:
    return _metric_over_time(
        spark, "avg_locality",
        table="T8", title="Fig 6f: query locality over time (BW, SSSP)",
        note="paper: Domain >95%, Hash ~38%, Q-cut converges to ~80%",
    )


# --------------------------------------------------------------------------
# T9 — Fig. 6g: ILS cost during one Q-cut run
# --------------------------------------------------------------------------

def table_t09(spark: SparkSession) -> TableResult:
    """First ILS execution on the Hash-partitioned BW graph (paper Fig. 6g).

    Paper: best-solution cost drops by >75% within the 2 s budget;
    perturbations visibly escape local minima."""
    from repro.cluster.partitioners import hash_partition

    net = bw_lite()
    _, _, phase1, trace_all = _main_bundle(spark, net, seed=42)
    queries = [q for q in phase1 if q.batch < 8]  # first 128 queries
    trace = trace_all.restrict([q.qid for q in queries])
    assignment = hash_partition(net.n_vertices, 8)
    stats = TraceStats(spark, trace)
    try:
        qids = sorted(int(q) for q in trace.activations["qid"].unique())
        ls_pdf = stats.local_scope_sizes(assignment, qids)
        ov_pdf = stats.global_pair_overlaps(qids)
    finally:
        stats.close()
    ls = np.zeros((len(qids), 8))
    pos = {q: i for i, q in enumerate(qids)}
    for q, w, sz in ls_pdf[["qid", "worker", "size"]].itertuples(index=False):
        ls[pos[int(q)], int(w)] = sz
    overlaps = {(int(a), int(b)): float(s)
                for a, b, s in ov_pdf[["qa", "qb", "shared"]].itertuples(index=False)}
    qres = run_qcut(
        QcutInput(qids=qids, ls=ls, vcounts=assignment.vertex_counts(),
                  overlaps=overlaps),
        time_budget=2.0,  # the paper's controller budget
        max_rounds=500,
        seed=0,
    )
    hist = pd.DataFrame({"step": range(len(qres.history)), "best_cost": qres.history})
    hist["perturbation"] = hist["step"].isin(qres.perturbation_steps)
    reduction = 1.0 - qres.cost_final / qres.cost_initial if qres.cost_initial else 0.0
    return TableResult(
        table="T9", title="Fig 6g: ILS best-cost trace (Hash-partitioned BW)",
        rows=hist,
        notes=f"cost {qres.cost_initial:.0f} -> {qres.cost_final:.0f} "
              f"(-{100*reduction:.0f}%; paper: >75%), "
              f"{len(qres.perturbation_steps)} perturbations",
        extras={"reduction": reduction, "result": qres},
    )


# --------------------------------------------------------------------------
# T10 — Fig. 7: scale-out on C1
# --------------------------------------------------------------------------

def table_t10(spark: SparkSession) -> TableResult:
    """Total latency vs number of workers on the C1 cluster preset.

    Paper (SSSP): Hash 927 s @k=2 -> 474 s @k=8 -> 863 s @k=16 (non-
    monotone); Q-cut/Hash 283 s @k=8; Domain 1790 -> 562 s (k 2->16);
    Q-cut/Domain 1150 -> 301 s. Similar results for POI."""
    net = bw_lite()
    rows = []
    for kind, seed in (("sssp", 46), ("poi", 47)):
        queries = (sssp_workload(net, seed=seed, n=N_SCALE) if kind == "sssp"
                   else poi_workload(net, seed=seed, n=N_SCALE))
        trace = trace_for(spark, net, queries)
        for k in (2, 4, 8, 16):
            for name, cfg in _strategies(k, C1).items():
                r = run_experiment(spark, net, queries, trace, cfg)
                rows.append({"kind": kind, "k": k, "strategy": name,
                             "total_latency": r.total_latency})
    return TableResult(
        table="T10", title="Fig 7: scalability on C1 (BW, SSSP & POI)",
        rows=pd.DataFrame(rows),
        notes="paper: Hash non-monotone (min at k=8), Q-cut best, "
              "Domain/Q-cut keep improving to k=16",
    )


ALL_TABLES = {
    "T1": table_t01, "T2": table_t02, "T3": table_t03, "T4": table_t04,
    "T5": table_t05, "T6": table_t06, "T7": table_t07, "T8": table_t08,
    "T9": table_t09, "T10": table_t10,
}
