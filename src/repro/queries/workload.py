"""Hotspot query workload generator (paper Section 4.1).

The paper determines the biggest cities of the road network, then samples a
start vertex around these *hotspots* with the number of queries per city
proportional to population. SSSP additionally gets an end vertex: in the
normal phase at *intra-urban* distance, in the disturbance phase of
Fig. 5a/5b at *inter-urban* distance ("between random neighboring cities").
POI queries only get a start vertex and search the closest tagged vertex.

Queries arrive in batches of ``batch_size`` parallel queries (paper: 16).
"""
from __future__ import annotations

from dataclasses import dataclass
from typing import Literal

import numpy as np

from repro.roadnet.generator import RoadNetwork

QueryKind = Literal["sssp", "poi"]


@dataclass(frozen=True)
class Query:
    """One graph analytics query: a vertex function plus initial vertices.

    ``qid`` is globally unique within a workload; ``batch`` orders arrival
    (all queries of a batch run in parallel). ``end`` is None for POI.
    """

    qid: int
    kind: QueryKind
    start: int
    end: int | None
    city: int
    batch: int


def _city_neighbor_order(net: RoadNetwork) -> np.ndarray:
    """cities sorted by centroid distance, per city (self excluded)."""
    cx = net.cities["cx"].to_numpy()
    cy = net.cities["cy"].to_numpy()
    d = np.hypot(cx[:, None] - cx[None, :], cy[:, None] - cy[None, :])
    np.fill_diagonal(d, np.inf)
    return np.argsort(d, axis=1)


def hotspot_queries(
    net: RoadNetwork,
    *,
    n_queries: int,
    batch_size: int = 16,
    kind: QueryKind = "sssp",
    inter_urban: bool = False,
    intra_radius_frac: float = 0.6,
    seed: int = 0,
    qid_offset: int = 0,
    batch_offset: int = 0,
) -> list[Query]:
    """Sample ``n_queries`` hotspot queries (city choice ∝ population).

    Intra-urban SSSP ends are sampled within ``intra_radius_frac`` of the
    city's extent around the start: the SSSP search region is a travel-time
    disc of radius dist(start, end) in *all* directions, so an
    unconstrained end on the far side of town would make every query scan
    well beyond its own city — real "home to my doctor" mapping queries
    (paper Application 1) are local.
    """
    rng = np.random.default_rng(seed)
    pop = net.cities["population"].to_numpy().astype(float)
    p = pop / pop.sum()
    n_cities = len(pop)
    neighbor_order = _city_neighbor_order(net) if n_cities > 1 else None
    vx = net.vertices["x"].to_numpy()
    vy = net.vertices["y"].to_numpy()
    out: list[Query] = []
    for i in range(n_queries):
        city = int(rng.choice(n_cities, p=p))
        verts = net.city_vertices(city)
        start = int(rng.choice(verts))
        end: int | None = None
        if kind == "sssp":
            if inter_urban and neighbor_order is not None:
                # disturbance phase: end in a random *neighboring* city
                nbr = int(neighbor_order[city, int(rng.integers(0, min(3, n_cities - 1)))])
                end = int(rng.choice(net.city_vertices(nbr)))
            else:
                extent = max(
                    vx[verts].max() - vx[verts].min(),
                    vy[verts].max() - vy[verts].min(),
                )
                d = np.hypot(vx[verts] - vx[start], vy[verts] - vy[start])
                near = verts[(d > 0) & (d <= intra_radius_frac * extent)]
                if len(near):
                    end = int(rng.choice(near))
                else:
                    end = int(verts[np.argsort(d)[1]])  # nearest other vertex
        out.append(
            Query(
                qid=qid_offset + i,
                kind=kind,
                start=start,
                end=end,
                city=city,
                batch=batch_offset + i // batch_size,
            )
        )
    return out


def queries_by_batch(queries: list[Query]) -> dict[int, list[Query]]:
    """Group queries by batch index, sorted by batch arrival order."""
    out: dict[int, list[Query]] = {}
    for q in queries:
        out.setdefault(q.batch, []).append(q)
    return dict(sorted(out.items()))
