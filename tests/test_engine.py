"""BSP engine correctness vs Dijkstra + trace invariants (Spark)."""
import numpy as np
import pandas as pd
import pytest

from repro.engine import run_queries
from repro.engine.trace import Trace, workload_key
from repro.queries.workload import Query, hotspot_queries
from repro.roadnet.datasets import edges_df, tiny_grid

from tests.reference import dijkstra, nearest_tagged


@pytest.fixture(scope="module")
def net():
    return tiny_grid()


@pytest.fixture(scope="module")
def workload(net):
    qs = hotspot_queries(net, n_queries=10, batch_size=5, seed=21)
    qs += hotspot_queries(net, n_queries=4, batch_size=2, kind="poi", seed=22,
                          qid_offset=100, batch_offset=10)
    qs += hotspot_queries(net, n_queries=4, batch_size=4, inter_urban=True,
                          seed=23, qid_offset=200, batch_offset=20)
    return qs


@pytest.fixture(scope="module")
def trace(spark, net, workload) -> Trace:
    return run_queries(spark, edges_df(spark, net), workload, net, max_iters=80)


class TestSSSPCorrectness:
    def test_target_distances_exact(self, net, workload, trace):
        fin = trace.final.set_index(["qid", "vid"])["dist"]
        truth = {}
        for q in workload:
            if q.kind != "sssp":
                continue
            if q.start not in truth:
                truth[q.start] = dijkstra(net, q.start)
            got = fin.get((q.qid, q.end), float("inf"))
            assert got == pytest.approx(truth[q.start].get(q.end, float("inf"))), (
                f"query {q.qid}: wrong distance to end vertex"
            )

    def test_all_final_distances_admissible(self, net, workload, trace):
        """Tentative distances never undercut the true shortest distance."""
        fin = trace.final
        for q in workload[:4]:
            truth = dijkstra(net, q.start)
            sub = fin[fin["qid"] == q.qid]
            for vid, dist in zip(sub["vid"], sub["dist"]):
                assert dist >= truth.get(int(vid), float("inf")) - 1e-9


class TestPOICorrectness:
    def test_nearest_tag_distance_exact(self, net, workload, trace):
        tags = set(net.vertices.loc[net.vertices["tag"], "vid"].tolist())
        fin = trace.final
        for q in workload:
            if q.kind != "poi":
                continue
            sub = fin[(fin["qid"] == q.qid) & (fin["vid"].isin(tags))]
            got = sub["dist"].min() if len(sub) else float("inf")
            assert got == pytest.approx(nearest_tagged(net, q.start))


class TestTraceInvariants:
    def test_iteration_zero_is_start_vertices(self, workload, trace):
        it0 = trace.activations[trace.activations["iter"] == 0]
        starts = {q.qid: q.start for q in workload}
        assert dict(zip(it0["qid"], it0["vid"])) == starts

    def test_message_sources_are_active(self, trace):
        act = set(map(tuple, trace.activations[["qid", "iter", "vid"]].to_numpy()))
        msg_src = set(map(tuple, trace.messages[["qid", "iter", "src"]].to_numpy()))
        assert msg_src <= act

    def test_activations_follow_messages(self, trace):
        """A vertex active in iteration i>0 received a message in i-1."""
        act = trace.activations
        later = act[act["iter"] > 0]
        received = set(
            map(tuple, (trace.messages[["qid", "iter", "dst"]]
                        .assign(iter=lambda d: d["iter"] + 1)).to_numpy())
        )
        got = set(map(tuple, later[["qid", "iter", "vid"]].to_numpy()))
        assert got <= received

    def test_every_query_terminates(self, workload, trace):
        assert set(trace.activations["qid"]) == {q.qid for q in workload}
        assert trace.iters_per_query().max() < 80

    def test_iters_contiguous_per_query(self, trace):
        for qid, grp in trace.activations.groupby("qid"):
            iters = sorted(grp["iter"].unique())
            assert iters == list(range(len(iters)))

    def test_no_duplicate_activations(self, trace):
        assert not trace.activations.duplicated(["qid", "iter", "vid"]).any()

    def test_messages_follow_graph_edges(self, net, trace):
        edges = set(zip(net.edges["src"], net.edges["dst"]))
        pairs = set(zip(trace.messages["src"], trace.messages["dst"]))
        assert pairs <= edges

    def test_global_scope(self, trace, workload):
        q = workload[0]
        gs = trace.global_scope(q.qid)
        assert q.start in gs
        a = trace.activations
        assert gs == set(a.loc[a["qid"] == q.qid, "vid"])

    def test_restrict(self, trace, workload):
        qids = [workload[0].qid, workload[1].qid]
        sub = trace.restrict(qids)
        assert set(sub.activations["qid"]) == set(qids)
        assert set(sub.final["qid"]) <= set(qids) | set(sub.final["qid"])

    def test_determinism(self, spark, net, workload, trace):
        again = run_queries(spark, edges_df(spark, net), workload, net, max_iters=80)
        a = trace.activations.sort_values(["qid", "iter", "vid"]).reset_index(drop=True)
        b = again.activations.sort_values(["qid", "iter", "vid"]).reset_index(drop=True)
        pd.testing.assert_frame_equal(a, b)


class TestValidation:
    def test_empty_workload_rejected(self, spark, net):
        with pytest.raises(ValueError):
            run_queries(spark, edges_df(spark, net), [], net)

    def test_duplicate_qids_rejected(self, spark, net):
        q = Query(qid=1, kind="poi", start=0, end=None, city=0, batch=0)
        with pytest.raises(ValueError):
            run_queries(spark, edges_df(spark, net), [q, q], net)

    def test_sssp_without_end_rejected(self, spark, net):
        q = Query(qid=1, kind="sssp", start=0, end=None, city=0, batch=0)
        with pytest.raises(ValueError):
            run_queries(spark, edges_df(spark, net), [q], net)


class TestWorkloadKey:
    def test_key_stable(self, net, workload):
        assert workload_key(net, workload) == workload_key(net, workload)

    def test_key_depends_on_queries(self, net, workload):
        assert workload_key(net, workload) != workload_key(net, workload[:-1])

    def test_key_depends_on_graph(self, workload):
        other = tiny_grid(seed=99)
        assert workload_key(tiny_grid(), workload) != workload_key(other, workload)
