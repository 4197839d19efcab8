"""Tests for the in-memory reference walker (repro.walks.reference)."""
import numpy as np
import pytest

from repro.walks.models import WalkTask
from repro.walks.reference import final_hops, reference_walk
from repro.walks.state import Walks

from .helpers import all_vertex_starts, path_graph_csr, random_csr, star_graph_csr


class TestTermination:
    def test_fixed_length(self):
        csr = random_csr(30, 90, seed=0)
        task = WalkTask(max_len=7, seed=1)
        starts = all_vertex_starts(csr, 2)
        rec = reference_walk(csr, task, starts)
        hops = final_hops(rec.paths)
        assert (hops == 7).all()  # connected enough: no dead ends expected

    def test_dead_end_stops(self):
        from repro.graphs.csr import csr_from_arrays

        # path 0-1 plus isolated 2: a walk from 2 cannot move.
        csr = csr_from_arrays(3, np.array([0, 1]), np.array([1, 0]))
        starts = Walks.from_sources(np.array([0]), np.array([2]))
        rec = reference_walk(csr, WalkTask(max_len=5), starts)
        assert final_hops(rec.paths)[0] == 0

    def test_restart_lengths(self):
        csr = random_csr(40, 160, seed=2)
        task = WalkTask(max_len=20, alpha=0.85, seed=3)
        starts = Walks.from_sources(np.arange(5000), np.full(5000, int(np.argmax(csr.deg))))
        rec = reference_walk(csr, task, starts)
        hops = final_hops(rec.paths)
        assert hops.min() >= 1 and hops.max() <= 20
        # E[len] for geometric(1-alpha) capped at 20 ~= 6.3
        assert 5.3 < hops.mean() < 7.3


class TestTrajectories:
    def test_paths_are_walks(self):
        csr = random_csr(30, 90, seed=4)
        task = WalkTask(max_len=6, p=2.0, q=0.5, seed=5)
        starts = all_vertex_starts(csr, 1)
        rec = reference_walk(csr, task, starts)
        for row in rec.paths:
            steps = row[row >= 0]
            for a, b in zip(steps[:-1], steps[1:]):
                assert b in csr.neighbors(a)

    def test_visits_match_paths(self):
        csr = random_csr(30, 90, seed=6)
        task = WalkTask(max_len=5, seed=7)
        starts = all_vertex_starts(csr, 2)
        rec = reference_walk(csr, task, starts)
        counted = np.bincount(rec.paths[rec.paths >= 0], minlength=csr.n)
        assert np.array_equal(counted, rec.visits)

    def test_deterministic(self):
        csr = random_csr(30, 90, seed=8)
        task = WalkTask(max_len=8, p=0.25, q=4.0, seed=9)
        a = reference_walk(csr, task, all_vertex_starts(csr, 2)).paths
        b = reference_walk(csr, task, all_vertex_starts(csr, 2)).paths
        assert np.array_equal(a, b)

    def test_star_alternates(self):
        csr = star_graph_csr(8)
        starts = Walks.from_sources(np.array([0]), np.array([0]))
        rec = reference_walk(csr, WalkTask(max_len=6, seed=10), starts)
        path = rec.paths[0]
        assert (path[::2][path[::2] >= 0] == 0).all()  # even hops at hub

    def test_path_graph_moves(self):
        csr = path_graph_csr(50)
        starts = Walks.from_sources(np.arange(10), np.full(10, 25))
        rec = reference_walk(csr, WalkTask(max_len=4, seed=11), starts)
        assert (final_hops(rec.paths) == 4).all()


class TestSeeds:
    @pytest.mark.parametrize("seed", [0, 1, 42])
    def test_seed_changes_walks(self, seed):
        csr = random_csr(30, 90, seed=12)
        a = reference_walk(csr, WalkTask(max_len=6, seed=seed), all_vertex_starts(csr, 1)).paths
        b = reference_walk(csr, WalkTask(max_len=6, seed=seed + 100), all_vertex_starts(csr, 1)).paths
        assert not np.array_equal(a, b)
