"""Experiment-harness building blocks (full tables run in benchmarks/)."""
import pytest

from repro.experiments import (
    ALL_TABLES,
    BATCH,
    N_DISTURB,
    N_MAIN,
    poi_workload,
    sssp_workload,
    trace_for,
)
from repro.roadnet.datasets import tiny_grid


class TestWorkloadBuilders:
    def test_sssp_workload_phases(self):
        net = tiny_grid()
        qs = sssp_workload(net, seed=1, n=32, disturb=16)
        assert len(qs) == 48
        assert len({q.qid for q in qs}) == 48
        main_batches = {q.batch for q in qs[:32]}
        disturb_batches = {q.batch for q in qs[32:]}
        assert max(main_batches) < min(disturb_batches)
        # disturbance queries are inter-urban: end outside start city
        for q in qs[32:]:
            assert int(net.vertices.loc[q.end, "city"]) != q.city

    def test_poi_workload(self):
        net = tiny_grid()
        qs = poi_workload(net, seed=2, n=8)
        assert all(q.kind == "poi" for q in qs)

    def test_paper_constants(self):
        assert BATCH == 16          # 16 parallel queries per batch (paper)
        assert N_MAIN % BATCH == 0
        assert N_DISTURB % BATCH == 0

    def test_all_tables_registered(self):
        assert list(ALL_TABLES) == [f"T{i}" for i in range(1, 11)]


class TestTraceCache:
    def test_trace_for_is_cached(self, spark):
        net = tiny_grid()
        qs = sssp_workload(net, seed=3, n=4)
        a = trace_for(spark, net, qs)
        b = trace_for(spark, net, qs)  # second call: loaded from parquet
        assert a.activations.equals(b.activations)
        assert a.final.sort_values(["qid", "vid"]).reset_index(drop=True).equals(
            b.final.sort_values(["qid", "vid"]).reset_index(drop=True)
        )
