"""Cross-engine trajectory parity — the strongest correctness check.

Because every engine draws step randomness from the counter-based
(walk, hop) hash, any *correct* scheduler must produce trajectories that are
bit-identical to the trivially-correct in-memory reference walker. This is
the mechanical form of the paper's Appendix-B proof that Algorithm 1
terminates with every walk fully updated. Parametrized over engines,
graphs, models (DeepWalk / Node2vec with several p,q), tasks (RWNV-like /
PRNV-like), partitions, and loading modes.
"""
import numpy as np
import pytest

from repro.disk.iosim import DiskSim
from repro.disk.store import BlockStore
from repro.engines.bi_block import run_bi_block
from repro.engines.plain_bucket import run_plain_bucket
from repro.engines.sgsc import run_sgsc
from repro.engines.sogw import run_sogw
from repro.walks.models import WalkTask
from repro.walks.reference import reference_walk
from repro.walks.state import Walks

from .helpers import all_vertex_starts, even_partition, random_csr

ENGINES = {
    "SOGW": run_sogw,
    "SGSC": run_sgsc,
    "PB": run_plain_bucket,
    "Bi-Block": run_bi_block,
}


def _store(csr, n_blocks, cache="none"):
    return BlockStore(csr, even_partition(csr.n, n_blocks))


def _run(fn, store, task, starts, **kw):
    sim = DiskSim(params=store.params)
    return fn(store, task, starts, sim=sim, record_paths=True, record_visits=True, **kw)


@pytest.mark.parametrize("engine", list(ENGINES))
@pytest.mark.parametrize(
    "p,q", [(1.0, 1.0), (4.0, 0.25), (0.25, 4.0)], ids=["pq1", "p4q.25", "p.25q4"]
)
def test_rwnv_parity(engine, p, q):
    csr = random_csr(80, 300, seed=1)
    task = WalkTask(max_len=12, p=p, q=q, seed=5)
    store = _store(csr, 6)
    ref = reference_walk(csr, task, all_vertex_starts(csr, 2))
    res = _run(ENGINES[engine], store, task, all_vertex_starts(csr, 2))
    assert np.array_equal(res.recorder.paths, ref.paths)
    assert np.array_equal(res.recorder.visits, ref.visits)


@pytest.mark.parametrize("engine", list(ENGINES))
def test_prnv_parity(engine):
    csr = random_csr(60, 200, seed=2)
    task = WalkTask(max_len=20, alpha=0.85, seed=7)
    q = int(np.argmax(csr.deg))
    starts = lambda: Walks.from_sources(np.arange(300), np.full(300, q))  # noqa: E731
    ref = reference_walk(csr, task, starts())
    res = _run(ENGINES[engine], store=_store(csr, 5), task=task, starts=starts())
    assert np.array_equal(res.recorder.paths, ref.paths)


@pytest.mark.parametrize("engine", list(ENGINES))
def test_first_order_parity(engine):
    csr = random_csr(70, 240, seed=3)
    task = WalkTask(max_len=10, first_order=True, seed=9)
    ref = reference_walk(csr, task, all_vertex_starts(csr, 2))
    res = _run(ENGINES[engine], _store(csr, 4), task, all_vertex_starts(csr, 2))
    assert np.array_equal(res.recorder.paths, ref.paths)


@pytest.mark.parametrize("n_blocks", [1, 2, 3, 7, 13])
def test_bi_block_any_partition(n_blocks):
    """Correctness must not depend on the block count (Appendix B)."""
    csr = random_csr(60, 220, seed=4)
    task = WalkTask(max_len=10, p=0.5, q=2.0, seed=11)
    ref = reference_walk(csr, task, all_vertex_starts(csr, 2))
    res = _run(run_bi_block, _store(csr, n_blocks), task, all_vertex_starts(csr, 2))
    assert np.array_equal(res.recorder.paths, ref.paths)


@pytest.mark.parametrize("loading", ["full", "ondemand"])
def test_bi_block_loading_modes(loading):
    """On-demand loading changes I/O accounting, never trajectories (§5.1)."""
    csr = random_csr(70, 260, seed=5)
    task = WalkTask(max_len=12, p=2.0, q=0.5, seed=13)
    ref = reference_walk(csr, task, all_vertex_starts(csr, 2))
    res = _run(run_bi_block, _store(csr, 6), task, all_vertex_starts(csr, 2), loading=loading)
    assert np.array_equal(res.recorder.paths, ref.paths)


@pytest.mark.parametrize("scheduler", ["alphabet", "iteration", "min_height", "max_sum", "graphwalker"])
def test_sogw_any_scheduler(scheduler):
    """Current-block scheduling must not change results (Appendix A)."""
    csr = random_csr(60, 200, seed=6)
    task = WalkTask(max_len=8, seed=15)
    ref = reference_walk(csr, task, all_vertex_starts(csr, 1))
    res = _run(run_sogw, _store(csr, 5), task, all_vertex_starts(csr, 1), scheduler=scheduler)
    assert np.array_equal(res.recorder.paths, ref.paths)


def test_all_engines_identical_to_each_other():
    csr = random_csr(90, 350, seed=7)
    task = WalkTask(max_len=15, p=4.0, q=4.0, seed=17)
    store = _store(csr, 8)
    paths = [
        _run(fn, store, task, all_vertex_starts(csr, 2)).recorder.paths
        for fn in ENGINES.values()
    ]
    for other in paths[1:]:
        assert np.array_equal(paths[0], other)


def test_uneven_partition_parity():
    from repro.graphs.partition import Partition

    csr = random_csr(50, 170, seed=8)
    store = BlockStore(csr, Partition(np.array([0, 3, 40, 44, 50])))
    task = WalkTask(max_len=9, p=0.25, q=0.25, seed=19)
    ref = reference_walk(csr, task, all_vertex_starts(csr, 2))
    res = _run(run_bi_block, store, task, all_vertex_starts(csr, 2))
    assert np.array_equal(res.recorder.paths, ref.paths)
