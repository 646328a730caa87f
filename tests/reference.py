"""Driver-side reference implementations used as test oracles.

``dijkstra`` is the ground truth for the BSP engine's SSSP/POI results: the
engine's target-bound pruning preserves exact distances *at target vertices*
(every prefix of a shortest path to a target strictly beats the bound under
positive weights), so tests compare target distances, not the full frontier.
"""
from __future__ import annotations

import heapq

from repro.roadnet.generator import RoadNetwork


def dijkstra(net: RoadNetwork, src: int) -> dict[int, float]:
    """Exact single-source shortest travel times from ``src``."""
    adj = net.adjacency()
    dist: dict[int, float] = {src: 0.0}
    pq: list[tuple[float, int]] = [(0.0, src)]
    while pq:
        d, u = heapq.heappop(pq)
        if d > dist.get(u, float("inf")):
            continue
        for v, w in adj[u]:
            nd = d + w
            if nd < dist.get(v, float("inf")):
                dist[v] = nd
                heapq.heappush(pq, (nd, v))
    return dist


def nearest_tagged(net: RoadNetwork, src: int) -> float:
    """Travel time to the closest tagged vertex (POI ground truth)."""
    dist = dijkstra(net, src)
    tags = net.vertices.loc[net.vertices["tag"], "vid"]
    return min((dist.get(int(t), float("inf")) for t in tags), default=float("inf"))
