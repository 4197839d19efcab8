"""GraSorw system facade: Spark-built disk image + engine dispatch.

``GraphSystem.build`` runs the Spark side (CSR sort, partitioning, optional
METIS-lite relabeling, block materialization on disk) and returns a system
handle; ``run`` dispatches to any of the paper's engines; ``train_load_model``
implements the §5.2.2 protocol (run the task twice — full-load then
on-demand — and fit the per-block linear models).
"""
from __future__ import annotations

from dataclasses import dataclass
from pathlib import Path

import numpy as np
from pyspark.sql import DataFrame

from repro.disk.iosim import DiskSim, IOParams
from repro.disk.store import BlockStore
from repro.engines.base import EngineResult
from repro.engines.bi_block import run_bi_block
from repro.engines.first_order import run_first_order
from repro.engines.loading import FULL, LEARNED, ONDEMAND, LearnedLoadModel, LoadLogs
from repro.engines.plain_bucket import run_plain_bucket
from repro.engines.sgsc import run_sgsc
from repro.engines.sogw import run_sogw
from repro.graphs.csr import CSR, build_csr
from repro.graphs.partition import (
    Partition,
    metis_lite_partition,
    relabel_edges,
    sequential_partition,
)
from repro.walks.models import WalkTask
from repro.walks.state import Walks


@dataclass
class GraphSystem:
    """A partitioned graph on (simulated) disk plus its I/O configuration."""

    store: BlockStore
    cache: str = "none"  # page-cache mode handed to each run's DiskSim
    perm: np.ndarray | None = None  # vertex relabeling, if a custom partition

    @classmethod
    def build(
        cls,
        edges: DataFrame,
        n: int,
        *,
        n_blocks: int | None = None,
        block_bytes: int | None = None,
        partition: str = "seq",
        cache: str = "none",
        params: IOParams | None = None,
        physical_dir: str | Path | None = None,
        physical: bool = False,
    ) -> "GraphSystem":
        """Build the disk image: partition (Spark), CSR (Spark sort), blocks."""
        perm = None
        if partition == "metis":
            if n_blocks is None:
                raise ValueError("metis partition requires n_blocks")
            perm, part = metis_lite_partition(edges, n, n_blocks)
            edges = relabel_edges(edges, perm)
        elif partition == "seq":
            part = sequential_partition(edges, n, n_blocks=n_blocks, block_bytes=block_bytes)
        else:
            raise ValueError(f"unknown partition {partition!r}")
        csr = build_csr(edges, n)
        store = BlockStore(
            csr, part, params=params, physical_dir=physical_dir, physical=physical
        )
        return cls(store=store, cache=cache, perm=perm)

    def new_sim(self) -> DiskSim:
        return DiskSim(params=self.store.params, cache=self.cache)

    @property
    def csr(self) -> CSR:
        return self.store.csr

    @property
    def part(self) -> Partition:
        return self.store.part

    def run(
        self,
        engine: str,
        task: WalkTask,
        starts: Walks,
        *,
        load_model: LearnedLoadModel | None = None,
        loading: str | None = None,
        record_paths: bool = False,
        **kw,
    ) -> EngineResult:
        """Run one engine. Engines: SOGW, SGSC, PB, GraSorw (bi-block),
        GraSorw-full / GraSorw-ondemand (forced loading), GraphWalker,
        GraSorw-FO / GraSorw-FO-No-LBL (first-order modes)."""
        sim = self.new_sim()
        if engine == "SOGW":
            return run_sogw(self.store, task, starts, sim=sim, record_paths=record_paths, **kw)
        if engine == "SGSC":
            return run_sgsc(self.store, task, starts, sim=sim, record_paths=record_paths, **kw)
        if engine == "PB":
            return run_plain_bucket(
                self.store, task, starts, sim=sim, record_paths=record_paths, **kw
            )
        if engine == "GraSorw":
            mode = loading or (LEARNED if load_model is not None else FULL)
            return run_bi_block(
                self.store,
                task,
                starts,
                sim=sim,
                loading=mode,
                load_model=load_model,
                record_paths=record_paths,
                name="GraSorw",
                **kw,
            )
        if engine == "GraphWalker":
            return run_first_order(
                self.store, task, starts, sim=sim, scheduler="graphwalker",
                loading=FULL, name="GraphWalker", record_paths=record_paths, **kw,
            )
        if engine == "GraSorw-FO":
            mode = loading or (LEARNED if load_model is not None else FULL)
            name = "GraSorw" if mode == LEARNED else "GraSorw-No-LBL"
            sched = kw.pop("scheduler", "iteration")
            return run_first_order(
                self.store, task, starts, sim=sim, scheduler=sched,
                loading=mode, load_model=load_model, name=name,
                record_paths=record_paths, **kw,
            )
        raise ValueError(f"unknown engine {engine!r}")

    def train_load_model(
        self, task: WalkTask, starts: Walks, *, first_order: bool = False
    ) -> tuple[LearnedLoadModel, LoadLogs]:
        """§5.2.2: run the task once per forced loading mode, fit the model."""
        logs = LoadLogs()
        for mode in (FULL, ONDEMAND):
            sim = self.new_sim()
            if first_order:
                run_first_order(
                    self.store, task, starts, sim=sim, scheduler="iteration",
                    loading=mode, load_logs=logs,
                )
            else:
                run_bi_block(
                    self.store, task, starts, sim=sim, loading=mode, load_logs=logs
                )
        return LearnedLoadModel.fit(logs, self.store.n_blocks), logs
