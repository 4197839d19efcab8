"""Benchmark task definitions (paper §7.1) and exact references.

* **RWNV** — random walk generation with the Node2vec model: every vertex
  (with at least one edge) starts ``walks_per_vertex`` walks of fixed
  ``length`` (paper: 10 walks × length 80; the lite datasets scale these
  down, recorded in EXPERIMENTS.md).
* **PRNV** — PageRank query with the Node2vec model: second-order random
  walk with restart from a query vertex (decay 0.85, max length 20,
  ``samples_per_query`` ≈ 4·|V| walks per query); visit counts estimate the
  second-order PageRank.
* **DeepWalk** — the first-order benchmark of §7.8.

``expected_visits`` computes the exact PRNV visit expectation by dense
dynamic programming over (prev, cur) edge states — the statistical oracle
for PRNV correctness tests.
"""
from __future__ import annotations

from dataclasses import dataclass

import numpy as np

from repro.graphs.csr import CSR
from repro.rng import unit_hash
from repro.walks.models import WalkTask, exact_step_distribution
from repro.walks.state import Walks


@dataclass(frozen=True)
class RWNVConfig:
    """Random walk generation using the Node2vec model."""

    walks_per_vertex: int = 10
    length: int = 80
    p: float = 1.0
    q: float = 1.0
    seed: int = 7

    def task(self) -> WalkTask:
        return WalkTask(max_len=self.length, p=self.p, q=self.q, seed=self.seed)

    def starts(self, csr: CSR) -> Walks:
        src_v = np.flatnonzero(csr.deg > 0).astype(np.int64)
        src = np.repeat(src_v, self.walks_per_vertex)
        return Walks.from_sources(np.arange(len(src), dtype=np.int64), src)


@dataclass(frozen=True)
class DeepWalkConfig:
    """First-order random walk generation (DeepWalk model, §7.8)."""

    walks_per_vertex: int = 10
    length: int = 80
    seed: int = 7

    def task(self) -> WalkTask:
        return WalkTask(max_len=self.length, first_order=True, seed=self.seed)

    def starts(self, csr: CSR) -> Walks:
        src_v = np.flatnonzero(csr.deg > 0).astype(np.int64)
        src = np.repeat(src_v, self.walks_per_vertex)
        return Walks.from_sources(np.arange(len(src), dtype=np.int64), src)


@dataclass(frozen=True)
class PRNVConfig:
    """PageRank query using the Node2vec model (second-order RW + restart)."""

    n_queries: int = 10
    samples_per_query: int | None = None  # None → 4·|V| (the paper's setting)
    alpha: float = 0.85
    max_len: int = 20
    p: float = 1.0
    q: float = 1.0
    seed: int = 7

    def task(self) -> WalkTask:
        return WalkTask(
            max_len=self.max_len, p=self.p, q=self.q, alpha=self.alpha, seed=self.seed
        )

    def queries(self, csr: CSR) -> np.ndarray:
        """Deterministic "random" query vertices: rank non-isolated vertices
        by a counter hash and take the first n_queries."""
        cand = np.flatnonzero(csr.deg > 0).astype(np.int64)
        u = unit_hash(self.seed, cand, np.zeros_like(cand), salt=77)
        return cand[np.argsort(u, kind="stable")[: self.n_queries]]

    def starts(self, csr: CSR) -> Walks:
        spq = self.samples_per_query if self.samples_per_query is not None else 4 * csr.n
        src = np.repeat(self.queries(csr), spq)
        return Walks.from_sources(np.arange(len(src), dtype=np.int64), src)


def expected_visits(csr: CSR, task: WalkTask, query: int) -> np.ndarray:
    """Exact expected visit counts of one PRNV walk from ``query``.

    Dense DP over (prev, cur) states: a step from hop h happens with
    probability 1 (h = 0) or ``alpha`` (h ≥ 1), up to ``max_len`` hops —
    mirroring :func:`repro.walks.models.done_mask` in expectation. Only for
    tiny graphs (O(V^3) per hop).
    """
    n = csr.n
    visits = np.zeros(n)
    visits[query] += 1.0
    if csr.deg[query] == 0 or task.max_len == 0:
        return visits
    # Hop 1: first-order step from the query vertex.
    state = np.zeros((n, n))  # state[u, v] = P(walk alive at (prev=u, cur=v))
    d0 = exact_step_distribution(csr, task, -1, query)
    state[query, :] = d0
    visits += d0
    for _ in range(1, task.max_len):
        alive = (task.alpha if task.alpha is not None else 1.0) * state
        new = np.zeros((n, n))
        for u, v in zip(*np.nonzero(alive)):
            if csr.deg[v] == 0:
                continue
            new[v, :] += alive[u, v] * exact_step_distribution(csr, task, u, v)
        state = new
        visits += state.sum(axis=0)
        if state.sum() < 1e-12:
            break
    return visits
