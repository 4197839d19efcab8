"""Trivially-correct in-memory walker — the correctness oracle for engines.

Runs every walk to termination with the whole graph in memory, drawing from
the same counter-based RNG as the disk engines. Because draws are keyed by
(walk, hop), any correct scheduler must reproduce these trajectories
*bit-for-bit*; tests assert exactly that (the mechanical analogue of the
paper's Appendix-B correctness proof of Algorithm 1).
"""
from __future__ import annotations

import numpy as np

from repro.graphs.csr import CSR
from repro.walks.models import Recorder, WalkTask, advance, done_mask
from repro.walks.state import Walks


def reference_walk(
    csr: CSR,
    task: WalkTask,
    starts: Walks,
    *,
    record_paths: bool = True,
) -> Recorder:
    """Run all walks to completion in memory; returns the Recorder."""
    rec = Recorder(csr.n, len(starts), task.max_len, record_paths=record_paths)
    rec.on_start(starts)
    walks = starts
    while len(walks):
        done = done_mask(task, csr, walks)
        walks = walks.select(~done)
        if not len(walks):
            break
        walks = advance(csr, task, walks, rec)
    return rec


def final_hops(paths: np.ndarray) -> np.ndarray:
    """Length (number of hops) of each recorded trajectory."""
    return (paths >= 0).sum(axis=1) - 1
