"""Vertex programs for the paper's two query types (Section 4.1).

Both SSSP and POI are distance relaxations from a single start vertex under
the vertex-centric model: a vertex's query-specific data is its tentative
travel time from the start; active vertices send ``dist + w`` to neighbours;
a vertex re-activates when it receives a smaller value (min combiner).

They differ only in the *target set* that bounds the search:

* **SSSP(start, end)** — target = {end}. Messages that cannot be part of a
  shorter path to ``end`` (candidate >= current tentative dist(end)) are
  pruned; with positive weights every true shortest-path prefix strictly
  beats the bound, so the final dist(end) is exact.
* **POI(start)** — target = all tagged vertices; the bound is the distance
  of the closest tagged vertex found so far. Final result: the nearest
  tagged vertex and its travel time.

The shared relaxation loop lives in :mod:`repro.engine.pregel`; this module
builds the initial state and the per-query target sets.
"""
from __future__ import annotations

import numpy as np
import pandas as pd

from repro.queries.workload import Query
from repro.roadnet.generator import RoadNetwork


def init_state(queries: list[Query]) -> pd.DataFrame:
    """Initial BSP state: each query's start vertex at distance 0, active."""
    return pd.DataFrame(
        {
            "qid": np.array([q.qid for q in queries], dtype=np.int64),
            "vid": np.array([q.start for q in queries], dtype=np.int64),
            "dist": np.zeros(len(queries)),
        }
    )


def targets_for(queries: list[Query], net: RoadNetwork) -> pd.DataFrame:
    """(qid, vid) target membership driving bound pruning & termination."""
    qids: list[int] = []
    vids: list[int] = []
    tagged = net.vertices.loc[net.vertices["tag"], "vid"].to_numpy()
    for q in queries:
        if q.kind == "sssp":
            if q.end is None:
                raise ValueError(f"SSSP query {q.qid} has no end vertex")
            qids.append(q.qid)
            vids.append(q.end)
        elif q.kind == "poi":
            qids.extend([q.qid] * len(tagged))
            vids.extend(int(v) for v in tagged)
        else:
            raise ValueError(f"unknown query kind {q.kind!r}")
    return pd.DataFrame(
        {"qid": np.array(qids, dtype=np.int64), "vid": np.array(vids, dtype=np.int64)}
    )
