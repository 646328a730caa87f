"""CGA workload generator properties (paper §4.1 query generation)."""
import numpy as np
import pytest

from repro.queries.workload import Query, hotspot_queries, queries_by_batch
from repro.roadnet.datasets import bw_lite, tiny_grid


@pytest.fixture(scope="module")
def net():
    return bw_lite()


class TestBasics:
    def test_count_and_unique_qids(self, net):
        qs = hotspot_queries(net, n_queries=64, seed=0)
        assert len(qs) == 64
        assert len({q.qid for q in qs}) == 64

    def test_qid_offset(self, net):
        qs = hotspot_queries(net, n_queries=8, seed=0, qid_offset=100)
        assert [q.qid for q in qs] == list(range(100, 108))

    def test_batches_of_16(self, net):
        qs = hotspot_queries(net, n_queries=48, batch_size=16, seed=0)
        by_batch = queries_by_batch(qs)
        assert list(by_batch) == [0, 1, 2]
        assert all(len(v) == 16 for v in by_batch.values())

    def test_batch_offset(self, net):
        qs = hotspot_queries(net, n_queries=16, batch_size=16, seed=0, batch_offset=5)
        assert {q.batch for q in qs} == {5}

    def test_deterministic(self, net):
        a = hotspot_queries(net, n_queries=32, seed=7)
        b = hotspot_queries(net, n_queries=32, seed=7)
        assert a == b

    def test_seed_matters(self, net):
        a = hotspot_queries(net, n_queries=32, seed=7)
        b = hotspot_queries(net, n_queries=32, seed=8)
        assert a != b


class TestSSSP:
    def test_start_in_sampled_city(self, net):
        for q in hotspot_queries(net, n_queries=32, seed=1):
            assert q.start in set(net.city_vertices(q.city))

    def test_intra_urban_end_same_city(self, net):
        for q in hotspot_queries(net, n_queries=32, seed=2):
            assert q.end in set(net.city_vertices(q.city))
            assert q.end != q.start

    def test_intra_radius_respected(self, net):
        frac = 0.4
        v = net.vertices.set_index("vid")
        for q in hotspot_queries(net, n_queries=48, seed=3, intra_radius_frac=frac):
            verts = net.city_vertices(q.city)
            extent = max(
                v.loc[verts, "x"].max() - v.loc[verts, "x"].min(),
                v.loc[verts, "y"].max() - v.loc[verts, "y"].min(),
            )
            d = np.hypot(v.loc[q.end, "x"] - v.loc[q.start, "x"],
                         v.loc[q.end, "y"] - v.loc[q.start, "y"])
            # fallback (nearest vertex) may exceed frac only if no candidate
            assert d <= frac * extent + extent  # sanity bound
            assert d > 0

    def test_inter_urban_end_in_neighbor_city(self, net):
        cx = net.cities["cx"].to_numpy()
        cy = net.cities["cy"].to_numpy()
        for q in hotspot_queries(net, n_queries=32, seed=4, inter_urban=True):
            end_city = int(net.vertices.loc[q.end, "city"])
            assert end_city != q.city
            d = np.hypot(cx[q.city] - cx[end_city], cy[q.city] - cy[end_city])
            all_d = np.hypot(cx[q.city] - cx, cy[q.city] - cy)
            all_d[q.city] = np.inf
            # end city must be among the 3 nearest neighbours
            assert d <= np.sort(all_d)[2] + 1e-9


class TestPOI:
    def test_poi_has_no_end(self, net):
        for q in hotspot_queries(net, n_queries=16, kind="poi", seed=5):
            assert q.kind == "poi"
            assert q.end is None

    def test_poi_start_in_city(self, net):
        for q in hotspot_queries(net, n_queries=16, kind="poi", seed=6):
            assert q.start in set(net.city_vertices(q.city))


class TestHotspotSkew:
    def test_city_sampling_proportional_to_population(self, net):
        qs = hotspot_queries(net, n_queries=2000, seed=9)
        counts = np.bincount([q.city for q in qs], minlength=len(net.cities))
        pop = net.cities["population"].to_numpy().astype(float)
        expected = pop / pop.sum() * len(qs)
        # loose chi-square-style check on the biggest cities
        for c in range(4):
            assert abs(counts[c] - expected[c]) < 4 * np.sqrt(expected[c]) + 10

    def test_biggest_city_most_queried(self, net):
        qs = hotspot_queries(net, n_queries=1000, seed=10)
        counts = np.bincount([q.city for q in qs], minlength=len(net.cities))
        assert counts[0] == counts.max()


class TestQueriesByBatch:
    def test_sorted_batches(self):
        qs = [Query(qid=i, kind="poi", start=0, end=None, city=0, batch=b)
              for i, b in enumerate([2, 0, 1, 0])]
        assert list(queries_by_batch(qs)) == [0, 1, 2]

    def test_groups_complete(self):
        net = tiny_grid()
        qs = hotspot_queries(net, n_queries=10, batch_size=4, seed=0)
        grouped = queries_by_batch(qs)
        assert sum(len(v) for v in grouped.values()) == 10
        assert [len(v) for v in grouped.values()] == [4, 4, 2]
