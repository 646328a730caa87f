"""Static partitioners: Hash, Domain (best-case), LDG (paper §4.1)."""
import numpy as np
import pytest

from repro.cluster.partitioners import domain_partition, hash_partition, ldg_partition
from repro.roadnet.datasets import bw_lite, tiny_grid
from repro.roadnet.generator import HIGHWAY_CITY


@pytest.fixture(scope="module")
def net():
    return tiny_grid()


class TestHash:
    def test_mod_k(self):
        a = hash_partition(10, 3)
        np.testing.assert_array_equal(a.workers, np.arange(10) % 3)

    @pytest.mark.parametrize("k", [1, 2, 4, 8])
    def test_near_perfect_balance(self, k):
        a = hash_partition(1000, k)
        counts = a.vertex_counts()
        assert counts.max() - counts.min() <= 1

    def test_rejects_k0(self):
        with pytest.raises(ValueError):
            hash_partition(10, 0)


class TestDomain:
    @pytest.mark.parametrize("k", [2, 4])
    def test_cities_kept_whole(self, net, k):
        a = domain_partition(net, k)
        for c in range(len(net.cities)):
            vids = net.city_vertices(c)
            assert len(set(a.worker_of(vids))) == 1, f"city {c} split"

    def test_every_worker_used(self, net):
        a = domain_partition(net, 2)
        assert set(a.workers) == {0, 1}

    def test_more_workers_than_cities(self, net):
        k = len(net.cities) + 2
        a = domain_partition(net, k)
        # each city still whole
        for c in range(len(net.cities)):
            assert len(set(a.worker_of(net.city_vertices(c)))) == 1

    def test_highways_follow_nearest_city(self, net):
        a = domain_partition(net, 2)
        v = net.vertices
        hw = v[v["city"] == HIGHWAY_CITY]
        cx = net.cities["cx"].to_numpy()
        cy = net.cities["cy"].to_numpy()
        for row in hw.itertuples(index=False):
            nearest = int(np.argmin(np.hypot(row.x - cx, row.y - cy)))
            city_worker = a.worker_of(net.city_vertices(nearest))[0]
            assert a.workers[row.vid] == city_worker

    def test_geographic_blocks_contiguous_in_x(self):
        net = bw_lite()
        a = domain_partition(net, 4)
        # cities sorted by x coordinate must have non-decreasing block ids
        order = net.cities.sort_values(["cx", "cy"])["city"].to_numpy()
        workers = [a.worker_of(net.city_vertices(int(c)))[0] for c in order]
        assert workers == sorted(workers)

    def test_rejects_k0(self, net):
        with pytest.raises(ValueError):
            domain_partition(net, 0)


class TestLDG:
    def test_capacity_respected(self, net):
        k, slack = 4, 0.1
        a = ldg_partition(net, k, slack=slack)
        cap = net.n_vertices * (1 + slack) / k
        assert a.vertex_counts().max() <= cap + 1

    def test_deterministic(self, net):
        a = ldg_partition(net, 3)
        b = ldg_partition(net, 3)
        np.testing.assert_array_equal(a.workers, b.workers)

    def test_better_edge_locality_than_hash(self, net):
        """LDG's greedy neighbour affinity must beat random hashing on
        edge-cut — the property the paper's baseline is built on."""
        k = 4
        ldg = ldg_partition(net, k)
        hsh = hash_partition(net.n_vertices, k)

        def edge_cut(a):
            s = a.worker_of(net.edges["src"].to_numpy())
            d = a.worker_of(net.edges["dst"].to_numpy())
            return int((s != d).sum())

        assert edge_cut(ldg) < edge_cut(hsh)

    def test_all_vertices_assigned(self, net):
        a = ldg_partition(net, 3)
        assert (a.workers >= 0).all()

    def test_rejects_k0(self, net):
        with pytest.raises(ValueError):
            ldg_partition(net, 0)
