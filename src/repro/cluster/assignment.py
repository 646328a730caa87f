"""Vertex → worker assignment (the function A of paper Section 2).

Vertices are contiguous ``0..n-1``, so an assignment is a dense int array.
``move_vertices`` implements the worker-API call ``move(LS(q,w), w, w')``
(paper Table 2) at the vertex level: the controller ships a set of vertex
ids from one worker to another.
"""
from __future__ import annotations

from dataclasses import dataclass

import numpy as np
import pandas as pd
from pyspark.sql import DataFrame, SparkSession


@dataclass(frozen=True)
class Assignment:
    """Immutable vertex→worker map over ``k`` workers."""

    workers: np.ndarray  # int32, indexed by vid
    k: int

    def __post_init__(self):
        w = np.asarray(self.workers)
        if len(w) and (w.min() < 0 or w.max() >= self.k):
            raise ValueError("worker id out of range")

    @property
    def n_vertices(self) -> int:
        return len(self.workers)

    def worker_of(self, vids) -> np.ndarray:
        """Vectorized lookup: worker id for each vid."""
        return self.workers[np.asarray(vids, dtype=np.int64)]

    def vertex_counts(self) -> np.ndarray:
        """|V(w)| for each worker (paper A.1 workload term)."""
        return np.bincount(self.workers, minlength=self.k)

    def move_vertices(self, vids, dst_worker: int) -> "Assignment":
        """New assignment with ``vids`` reassigned to ``dst_worker``."""
        if not (0 <= dst_worker < self.k):
            raise ValueError(f"dst worker {dst_worker} out of range")
        w = self.workers.copy()
        w[np.asarray(list(vids), dtype=np.int64)] = dst_worker
        return Assignment(workers=w, k=self.k)

    def to_pandas(self) -> pd.DataFrame:
        return pd.DataFrame(
            {
                "vid": np.arange(len(self.workers), dtype=np.int64),
                "worker": self.workers.astype(np.int32),
            }
        )

    def to_spark(self, spark: SparkSession) -> DataFrame:
        return spark.createDataFrame(self.to_pandas())
