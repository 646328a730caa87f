"""The multi-query BSP superstep loop (paper Section 2, "Background").

One loop executes *all* queries of a workload simultaneously — states are
keyed by (qid, vid), so queries are logically independent exactly as in
Q-Graph's decoupled per-query execution. Each superstep is a pair of Spark
DataFrame jobs over Catalyst (state ⋈ edges → min-combined messages →
full-outer state update); there is no driver-side per-vertex work.

The loop records the activation and message trace needed by the simulated
cluster (see :mod:`repro.engine.trace`); since BSP execution is
partition-independent, the trace is computed once per workload and re-priced
under every partitioning/synchronization configuration.
"""
from __future__ import annotations

import math

import pandas as pd
from pyspark.sql import DataFrame, SparkSession
from pyspark.sql import functions as F

from repro.engine.trace import Trace
from repro.engine.vertex_programs import init_state, targets_for
from repro.queries.workload import Query
from repro.roadnet.generator import RoadNetwork

_INF = float(math.inf)


def _bsp_loop(
    spark: SparkSession,
    edges: DataFrame,
    state0: pd.DataFrame,
    targets: pd.DataFrame,
    *,
    max_iters: int,
) -> Trace:
    """Run the relaxation loop until no query has an active vertex."""
    edges = edges.select("src", "dst", "w").cache()
    targets_df = (
        spark.createDataFrame(targets)
        if len(targets)
        else spark.createDataFrame(pd.DataFrame({"qid": pd.Series(dtype="int64"),
                                                 "vid": pd.Series(dtype="int64")}))
    ).cache()
    state = spark.createDataFrame(state0.assign(active=True)).localCheckpoint()

    act_frames: list[pd.DataFrame] = []
    msg_frames: list[pd.DataFrame] = []
    for it in range(max_iters):
        active = state.filter(F.col("active"))
        act_pdf = active.select("qid", "vid").toPandas()
        if act_pdf.empty:
            break
        act_frames.append(act_pdf.assign(iter=it))

        # current per-query bound: best tentative distance at any target
        bounds = (
            state.join(targets_df, ["qid", "vid"])
            .groupBy("qid")
            .agg(F.min("dist").alias("bound"))
        )
        msgs = (
            active.join(edges, active["vid"] == edges["src"])
            .select(
                active["qid"].alias("qid"),
                edges["src"].alias("src"),
                edges["dst"].alias("dst"),
                (active["dist"] + edges["w"]).alias("cand"),
            )
            .join(bounds, "qid", "left")
            .filter(F.col("bound").isNull() | (F.col("cand") < F.col("bound")))
        )
        msg_pdf = msgs.select("qid", "src", "dst").toPandas()
        msg_frames.append(msg_pdf.assign(iter=it))

        agg = (
            msgs.groupBy("qid", "dst")
            .agg(F.min("cand").alias("cand"))
            .withColumnRenamed("dst", "vid")
        )
        joined = state.select("qid", "vid", "dist").join(agg, ["qid", "vid"], "full_outer")
        state = joined.select(
            "qid",
            "vid",
            F.least(
                F.coalesce(F.col("dist"), F.lit(_INF)),
                F.coalesce(F.col("cand"), F.lit(_INF)),
            ).alias("dist"),
            (
                F.col("cand").isNotNull()
                & (F.col("cand") < F.coalesce(F.col("dist"), F.lit(_INF)))
            ).alias("active"),
        ).localCheckpoint()

    final = state.select("qid", "vid", "dist").toPandas()
    edges.unpersist()
    targets_df.unpersist()

    cols_a = ["qid", "iter", "vid"]
    cols_m = ["qid", "iter", "src", "dst"]
    activations = (
        pd.concat(act_frames, ignore_index=True)[cols_a]
        if act_frames
        else pd.DataFrame(columns=cols_a)
    )
    messages = (
        pd.concat(msg_frames, ignore_index=True)[cols_m]
        if msg_frames
        else pd.DataFrame(columns=cols_m)
    )
    return Trace(activations=activations, messages=messages, final=final)


def run_queries(
    spark: SparkSession,
    edges: DataFrame,
    queries: list[Query],
    net: RoadNetwork,
    *,
    max_iters: int = 200,
) -> Trace:
    """Execute a workload of SSSP/POI queries; return its execution trace.

    ``edges`` is the (src, dst, w) DataFrame of ``net`` (both directions).
    All queries run in one shared superstep loop; per-query termination is
    implicit (a finished query simply has no active vertices left).
    """
    if not queries:
        raise ValueError("empty workload")
    qids = [q.qid for q in queries]
    if len(set(qids)) != len(qids):
        raise ValueError("duplicate qids in workload")
    return _bsp_loop(
        spark,
        edges,
        init_state(queries),
        targets_for(queries, net),
        max_iters=max_iters,
    )
