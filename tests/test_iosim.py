"""Tests for the I/O cost model and counters (repro.disk.iosim)."""
import numpy as np
import pytest

from repro.disk.iosim import DiskSim, IOParams


@pytest.fixture
def sim():
    return DiskSim(params=IOParams())


class TestBlockLoad:
    def test_counts(self, sim):
        sim.charge_block_load(0, 1000)
        sim.charge_block_load(1, 1000)
        assert sim.block_io_num == 2

    def test_sequential_cheaper_than_random(self):
        p = IOParams()
        a = DiskSim(params=p)
        a.charge_block_load(3, 10_000)
        a.charge_block_load(4, 10_000)  # sequential successor
        b = DiskSim(params=p)
        b.charge_block_load(3, 10_000)
        b.charge_block_load(9, 10_000)  # random jump
        assert a.block_io_s < b.block_io_s

    def test_time_formula_sequential(self):
        p = IOParams()
        sim = DiskSim(params=p)
        sim.charge_block_load(0, 2_000_000)
        sim.charge_block_load(1, 2_000_000)
        expect = (
            p.rand_block_seek_s + p.seq_seek_s + 2 * 2_000_000 / p.seq_bw_bps
        )  # first load is a jump from nowhere
        assert sim.block_io_s == pytest.approx(expect)

    def test_cached_block_cheaper(self):
        p = IOParams()
        cold = DiskSim(params=p)
        cold.charge_block_load(0, 1_000_000)
        hot = DiskSim(params=p, cache="all")
        hot.charge_block_load(0, 1_000_000)
        assert hot.block_io_s < cold.block_io_s


class TestVertexFetch:
    def test_counts_and_kinds(self, sim):
        sim.charge_vertex_fetch(np.array([100, 200]), kind="vertex")
        sim.charge_vertex_fetch(np.array([50]), kind="ondemand")
        assert sim.vertex_io_num == 2
        assert sim.ondemand_io_num == 1
        assert sim.vertex_io_s > 0 and sim.ondemand_io_s > 0

    def test_empty_is_free(self, sim):
        sim.charge_vertex_fetch(np.array([], dtype=np.int64))
        assert sim.vertex_io_num == 0 and sim.vertex_io_s == 0.0

    def test_bad_kind(self, sim):
        with pytest.raises(ValueError):
            sim.charge_vertex_fetch(np.array([1]), kind="bogus")

    def test_time_formula(self):
        p = IOParams()
        sim = DiskSim(params=p)
        sim.charge_vertex_fetch(np.array([1000, 3000]))
        assert sim.vertex_io_s == pytest.approx(2 * p.rand_lat_s + 4000 / p.rand_bw_bps)

    def test_cache_all_uses_hit_latency(self):
        p = IOParams()
        sim = DiskSim(params=p, cache="all")
        sim.charge_vertex_fetch(np.array([1000]))
        assert sim.vertex_io_s == pytest.approx(p.hit_lat_s + 1000 / p.mem_bw_bps)

    def test_block_load_beats_many_vertex_ios(self):
        """The paper's core premise: one sequential block I/O is far cheaper
        than fetching the same bytes as light random vertex I/Os (here a
        ~5x gap at 200 vertices; it grows linearly with block size)."""
        p = IOParams()
        block = DiskSim(params=p)
        block.charge_block_load(0, 0)  # position the head
        block.charge_block_load(1, 200 * 168)  # sequential successor
        base = DiskSim(params=p)
        base.charge_block_load(0, 0)
        scattered = DiskSim(params=p)
        scattered.charge_vertex_fetch(np.full(200, 168))
        seq_cost = block.block_io_s - base.block_io_s
        assert scattered.vertex_io_s > 5 * seq_cost


class TestWalkIO:
    def test_bytes(self, sim):
        sim.charge_walk_io(100)
        assert sim.walk_io_bytes == 100 * sim.params.walk_bytes
        assert sim.walk_io_s > 0

    def test_zero_free(self, sim):
        sim.charge_walk_io(0)
        assert sim.walk_io_bytes == 0 and sim.walk_io_s == 0.0


class TestClocks:
    def test_exec_model(self, sim):
        sim.steps = 1_000_000
        sim.bucket_execs = 10
        p = sim.params
        assert sim.exec_s == pytest.approx(1_000_000 * p.step_s + 10 * p.bucket_s)

    def test_wall_composition(self, sim):
        sim.charge_block_load(0, 1000)
        sim.charge_vertex_fetch(np.array([100]))
        sim.charge_walk_io(10)
        sim.steps = 100
        assert sim.wall_s == pytest.approx(sim.io_total_s + sim.exec_s)

    def test_snapshot_keys(self, sim):
        snap = sim.snapshot()
        for k in (
            "wall_s", "exec_s", "exec_real_s", "block_io_num", "block_io_s",
            "vertex_io_num", "vertex_io_s", "ondemand_io_num", "ondemand_io_s",
            "walk_io_bytes", "walk_io_s", "time_slots", "bucket_execs", "steps",
        ):
            assert k in snap
