"""Analytical disk I/O model (paper §7.6 substrate)."""
import pytest

from repro.core.search import SearchStats
from repro.storage.diskmodel import DiskModel


@pytest.fixture
def disk():
    return DiskModel(bandwidth=80e6, seek_s=0.010)


class TestPrimitives:
    def test_cost_formula(self, disk):
        assert disk.cost(3, 80e6) == pytest.approx(3 * 0.010 + 1.0)

    def test_zero_work_zero_cost(self, disk):
        assert disk.cost(0, 0) == 0.0


class TestEngineCosts:
    def test_les3_sequential_groups(self, disk):
        st = SearchStats(n_candidates=1000, n_groups_verified=4)
        got = disk.les3(st, avg_set_bytes=64.0)
        assert got == pytest.approx(4 * 0.010 + 1000 * 64 / 80e6)

    def test_invidx_random_probes(self, disk):
        st = SearchStats(n_candidates=100, index_elems=5000, n_probes=3)
        got = disk.invidx(st, avg_set_bytes=64.0)
        assert got == pytest.approx(
            (3 + 100) * 0.010 + (5000 * 8 + 100 * 64) / 80e6
        )

    def test_dualtrans_node_probes(self, disk):
        st = SearchStats(n_candidates=50, index_elems=20)
        got = disk.dualtrans(st, avg_set_bytes=64.0, d=8, fanout=32)
        assert got == pytest.approx(
            (20 + 50) * 0.010 + (20 * 2 * 8 * 8 + 50 * 64) / 80e6
        )

    def test_brute_single_scan(self, disk):
        assert disk.brute(10_000, 64.0) == pytest.approx(0.010 + 10_000 * 64 / 80e6)


class TestPaperShape:
    def test_sequential_beats_random_at_equal_bytes(self, disk):
        """The §7.6 story: for the same candidate volume, LES³'s few
        contiguous reads beat InvIdx's per-candidate random probes."""
        les3 = SearchStats(n_candidates=2000, n_groups_verified=5)
        inv = SearchStats(n_candidates=2000, index_elems=0, n_probes=5)
        assert disk.les3(les3, 64.0) < disk.invidx(inv, 64.0)

    def test_brute_beats_random_index_when_pruning_is_weak(self, disk):
        """With weak pruning, one sequential scan of all 10k sets beats
        fetching 5k candidates randomly — the paper's crossover."""
        weak = SearchStats(n_candidates=5000, index_elems=1000, n_probes=20)
        assert disk.brute(10_000, 64.0) < disk.invidx(weak, 64.0)

    def test_les3_beats_brute_with_strong_pruning(self, disk):
        # at realistic database sizes a couple of group seeks are far
        # cheaper than scanning everything
        strong = SearchStats(n_candidates=200, n_groups_verified=2)
        assert disk.les3(strong, 64.0) < disk.brute(100_000, 64.0)
