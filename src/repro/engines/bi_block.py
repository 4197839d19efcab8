"""GraSorw's bi-block execution engine (paper §4, Algorithms 1 and 2).

The current block id iterates 0..N_B-1 (Iteration-based scheduling, §4.1),
skipping blocks whose skewed-storage pool is empty. For each current block
``b`` the pooled walks are collected into buckets (Eq. 4, self-bucket ``b``
for walks that have not stepped yet — the paper's initialization stage,
executed in-line); ancillary blocks are then visited strictly upward
(``i = b+1 .. N_B-1``) — the *triangular* schedule, made correct by skewed
storage (walks with min-block ``b`` are exactly those whose "other" block
has a larger id). Walks update asynchronously while both their vertices
stay inside the two resident blocks; on exit they are re-associated per
Algorithm 2, including the *bucket-extending* case (a walk whose previous
vertex is in ``b`` and whose current block is a later ancillary joins that
bucket through an extension buffer and keeps moving within the same slot).

Ancillary blocks are loaded through a :class:`~repro.engines.loading.BlockLoader`
(full / on-demand / learned), which is where the §5 model plugs in.
"""
from __future__ import annotations

import time

import numpy as np

from repro.disk.iosim import DiskSim
from repro.disk.store import BlockStore
from repro.engines.base import EngineResult, WalkPools, make_recorder, split_done
from repro.engines.loading import FULL, BlockLoader, LearnedLoadModel, LoadLogs
from repro.walks.buckets import ExtensionBuffers, collect_buckets
from repro.walks.models import WalkTask, advance
from repro.walks.state import Walks, skewed_block_of


def _skewed_add(pools: WalkPools, store: BlockStore, walks: Walks) -> None:
    """Persist walks into pools under the skewed storage rule (§4.3.1)."""
    if not len(walks):
        return
    pb = np.where(walks.prev < 0, -1, store.block_of(np.maximum(walks.prev, 0)))
    cb = store.block_of(walks.cur)
    pools.add_grouped(skewed_block_of(pb, cb), walks)


def run_bi_block(
    store: BlockStore,
    task: WalkTask,
    starts: Walks,
    *,
    sim: DiskSim | None = None,
    loading: str = FULL,
    load_model: LearnedLoadModel | None = None,
    load_logs: LoadLogs | None = None,
    record_paths: bool = False,
    record_visits: bool = False,
    name: str = "Bi-Block",
) -> EngineResult:
    """Run the bi-block engine to completion. ``loading`` selects the
    ancillary block loading method: "full", "ondemand" or "learned"."""
    csr = store.csr
    nb = store.n_blocks
    sim = sim or DiskSim(params=store.params)
    rec = make_recorder(csr, task, starts, record_paths, record_visits)
    pools = WalkPools(sim, nb)
    loader = BlockLoader(store, sim, mode=loading, model=load_model, logs=load_logs)

    _, live = split_done(task, csr, starts)
    _skewed_add(pools, store, live)

    while pools.total():
        for b in range(nb):
            if pools.counts[b] == 0:
                continue
            walks = pools.pop(b)
            pb = np.where(walks.prev < 0, -1, store.block_of(np.maximum(walks.prev, 0)))
            cb = store.block_of(walks.cur)
            buckets = collect_buckets(walks, pb, cb, b)
            ext = ExtensionBuffers()
            if store.physical:
                store.read_block(b)
            sim.charge_block_load(b, store.block_bytes(b))  # current: always full
            sim.time_slots += 1

            for i in range(b, nb):  # i == b is the hop-0 self-bucket
                bucket = Walks.concat([buckets.get(i, Walks.empty()), ext.drain(i)])
                if not len(bucket):
                    continue
                if i != b:
                    in_block = lambda v: (v >= 0) & (store.block_of(np.maximum(v, 0)) == i)  # noqa: E731
                    activated = np.concatenate(
                        [bucket.prev[in_block(bucket.prev)], bucket.cur[in_block(bucket.cur)]]
                    )
                    loader.load(i, len(bucket), activated)
                sim.bucket_execs += 1
                active = bucket
                while len(active):
                    if i != b:
                        # On-demand residency for vertices used this step.
                        m_cur = store.block_of(active.cur) == i
                        loader.ensure(active.cur[m_cur])
                        has_prev = active.prev >= 0
                        m_prev = has_prev & (
                            store.block_of(np.maximum(active.prev, 0)) == i
                        )
                        loader.ensure(active.prev[m_prev])
                    t0 = time.perf_counter()
                    advance(csr, task, active, rec)
                    sim.steps += len(active)
                    sim.exec_real_s += time.perf_counter() - t0
                    _, alive = split_done(task, csr, active)
                    curb = store.block_of(alive.cur)
                    out = (curb != b) & (curb != i)
                    leaving = alive.select(out)
                    if len(leaving):
                        _classify_exits(store, pools, ext, leaving, b, i)
                    active = alive.select(~out)
                if i != b:
                    loader.finish()
            assert ext.is_empty(), "extension buffers must drain within the slot"
    return EngineResult(name=name, sim=sim, recorder=rec)


def _classify_exits(
    store: BlockStore,
    pools: WalkPools,
    ext: ExtensionBuffers,
    leaving: Walks,
    b: int,
    i: int,
) -> None:
    """Algorithm 2: re-associate walks that moved out of the resident pair.

    ``leaving`` walks have prev in {b, i} and cur elsewhere. Cases:
    cur < b → pool[cur]; b < cur < i → pool[b] if prev∈b else pool[cur];
    cur > i → bucket-extend to bucket[cur] if prev∈b else pool[i]. Every
    pool target equals min(B(prev), B(cur)) — the skewed storage invariant.
    """
    curb = store.block_of(leaving.cur)
    preb = store.block_of(leaving.prev)
    target = np.empty(len(leaving), dtype=np.int64)
    extend = np.zeros(len(leaving), dtype=bool)

    lo = curb < b
    target[lo] = curb[lo]
    mid = (curb > b) & (curb < i)
    target[mid & (preb == b)] = b
    target[mid & (preb != b)] = curb[mid & (preb != b)]
    hi = curb > i
    hi_ext = hi & (preb == b)
    extend[hi_ext] = True
    target[hi & ~hi_ext] = i

    if extend.any():
        ext.add(curb[extend], leaving.select(extend))
    rest = ~extend
    if rest.any():
        pools.add_grouped(target[rest], leaving.select(rest))
