"""Karger-style query clustering (paper Appendix A.1).

The number of (query, worker, worker) move combinations in the local search
can be very high, so the paper clusters queries "as a preprocessing step
into 4k clusters using a variant of the well-known Karger's algorithm with
linear runtime complexity [16] and moved whole clusters between workers".

We contract the *query-overlap graph* — queries as nodes, edge weight =
global-scope intersection size (the controller's aggregated I_w statistics)
— by repeatedly picking a random edge with probability proportional to its
weight and merging its endpoints, until at most ``target`` clusters remain
or no overlapping pair is left. Queries that never overlap stay singletons
(moving them jointly would be uninformed).
"""
from __future__ import annotations

import numpy as np


def karger_cluster(
    qids: list[int],
    overlaps: dict[tuple[int, int], float],
    *,
    target: int,
    rng: np.random.Generator,
    masses: dict[int, float] | None = None,
    max_mass: float | None = None,
) -> list[list[int]]:
    """Contract the overlap graph to <= ``target`` clusters of qids.

    ``masses``/``max_mass`` implement the *balanced* variant: a contraction
    is skipped when the merged cluster's total scope mass would exceed
    ``max_mass``. Without the cap, weight-proportional contraction merges
    an entire query hotspot (the Berlin case) into one atomic cluster that
    the δ-balance constraint can then never split across workers; capping
    keeps hotspots divided into a few movable chunks.
    """
    if target < 1:
        raise ValueError("target must be >= 1")
    parent = {q: q for q in qids}
    mass = {q: float((masses or {}).get(q, 0.0)) for q in qids}

    def find(q: int) -> int:
        while parent[q] != q:
            parent[q] = parent[parent[q]]
            q = parent[q]
        return q

    edges = [
        (a, b, float(w))
        for (a, b), w in sorted(overlaps.items())
        if a in parent and b in parent and a != b and w > 0
    ]
    n_comp = len(qids)
    while n_comp > target and edges:
        weights = np.array([w for _, _, w in edges])
        idx = int(rng.choice(len(edges), p=weights / weights.sum()))
        a, b, _ = edges[idx]
        ra, rb = find(a), find(b)
        if ra != rb and (
            max_mass is None or mass[ra] + mass[rb] <= max_mass
        ):
            parent[rb] = ra
            mass[ra] += mass[rb]
            n_comp -= 1
            # drop now-internal edges lazily
            edges = [(x, y, w) for x, y, w in edges if find(x) != find(y)]
        else:
            # contraction refused (same component or over the mass cap):
            # this edge can never fire again, remove it
            edges.pop(idx)

    clusters: dict[int, list[int]] = {}
    for q in qids:
        clusters.setdefault(find(q), []).append(q)
    return [sorted(v) for _, v in sorted(clusters.items())]
