"""Tests for the table runners (repro.core.tables) on a miniature registry.

The real lite datasets take minutes; these tests swap in tiny graphs with
the same structure so every ``run_tableN`` is exercised end-to-end —
including the paper-shape assertions that matter (Bi-Block halves block
I/Os; GraSorw beats SOGW end-to-end on disk-resident graphs; the dense
cache-resident regime flips the ranking).
"""
import numpy as np
import pandas as pd
import pytest

import repro.core.tables as T
from repro.graphs import generators as G
from repro.graphs.datasets import DatasetSpec

MINI2 = {
    "mini_social": DatasetSpec(
        name="mini_social",
        maker=lambda s: G.rmat_graph(s, scale=9, m=3000, seed=301),
        n=512, n_blocks=6, rwnv_wpv=2, rwnv_len=10,
        prnv_queries=2, prnv_spq=100,
    ),
    "mini_web": DatasetSpec(
        name="mini_web",
        maker=lambda s: G.locality_graph(s, n=512, deg=6, window=24,
                                         long_frac=0.03, seed=302),
        n=512, n_blocks=6, rwnv_wpv=2, rwnv_len=10,
        prnv_queries=2, prnv_spq=100,
    ),
}
MINI5 = {
    "mini_sparse": DatasetSpec(
        name="mini_sparse",
        maker=lambda s: G.er_pairs_graph(s, n=1024, m=3000, seed=303),
        n=1024, n_blocks=5, cache="all", rwnv_wpv=2, rwnv_len=10,
        prnv_queries=2, prnv_spq=100,
    ),
    "mini_dense": DatasetSpec(
        name="mini_dense",
        maker=lambda s: G.complete_graph(s, n=96),
        n=96, n_blocks=5, cache="all", rwnv_wpv=2, rwnv_len=10,
        prnv_queries=2, prnv_spq=100,
    ),
}


@pytest.fixture(autouse=True)
def mini_registry(monkeypatch):
    monkeypatch.setattr(T, "TABLE2", MINI2)
    monkeypatch.setattr(T, "TABLE5", MINI5)
    monkeypatch.setattr(T, "_SYSTEMS", {})
    yield


class TestTable3:
    @pytest.fixture(scope="class")
    def df(self, spark):
        import repro.core.tables as TT
        old2, old5, olds = TT.TABLE2, TT.TABLE5, TT._SYSTEMS
        TT.TABLE2, TT.TABLE5, TT._SYSTEMS = MINI2, MINI5, {}
        try:
            yield TT.run_table3(spark)
        finally:
            TT.TABLE2, TT.TABLE5, TT._SYSTEMS = old2, old5, olds

    def test_structure(self, df):
        assert set(df.engine) == {"PB", "Bi-Block"}
        assert set(df.bench) == {"RWNV", "PRNV"}
        assert len(df) == len(MINI2) * 2 * 2

    def test_triangular_halves_block_io(self, df):
        """The paper's Table 3 headline: fewer block I/Os everywhere; on the
        social graph (high edge-cut, like the paper's TW/FR) the ratio
        approaches the theoretical ~50%. The web-like mini graph has so few
        cross-block walks that the ratio is naturally closer to 1 at toy
        scale (the full lite run in EXPERIMENTS.md shows 0.4–0.6)."""
        r = df.loc[df.engine == "Bi-Block"].set_index(["dataset", "bench"])[
            "block_io_num_ratio"
        ]
        assert (r < 0.95).all()
        assert (r.loc["mini_social"] < 0.75).all()

    def test_bi_block_wall_wins(self, df):
        r = df.loc[df.engine == "Bi-Block", "wall_s_ratio"]
        assert (r < 1.0).all()

    def test_same_steps_both_engines(self, df):
        piv = df.pivot_table(index=["dataset", "bench"], columns="engine", values="steps")
        assert (piv["PB"] == piv["Bi-Block"]).all()


class TestTable4:
    def test_structure_and_shape(self, spark):
        df = T.run_table4(spark, datasets=("mini_web",))
        assert set(df.partition) == {"seq", "metis"}
        assert set(df.loading) == {"Pure Full Load", "Learning-based"}
        piv = df.pivot_table(
            index="partition", columns="loading", values="block_io_num"
        )
        # learning-based load must not increase full-block loads
        assert (piv["Learning-based"] <= piv["Pure Full Load"]).all()

    def test_metis_reduces_block_io(self, spark):
        df = T.run_table4(spark, datasets=("mini_web",))
        full = df[df.loading == "Pure Full Load"].set_index("partition")
        assert full.loc["metis", "block_io_num"] <= full.loc["seq", "block_io_num"]


class TestTable6:
    @pytest.fixture(scope="class")
    def df(self, spark):
        import repro.core.tables as TT
        old2, old5, olds = TT.TABLE2, TT.TABLE5, TT._SYSTEMS
        TT.TABLE2, TT.TABLE5, TT._SYSTEMS = MINI2, MINI5, {}
        try:
            yield TT.run_table6(spark)
        finally:
            TT.TABLE2, TT.TABLE5, TT._SYSTEMS = old2, old5, olds

    def test_structure(self, df):
        assert set(df.engine) == {"SOGW", "SGSC", "GraSorw"}
        assert len(df) == len(MINI5) * 2 * 3

    def test_sparse_cached_grasorw_competitive(self, df):
        """On the sparse cache-resident graph GraSorw wins (paper: RandomG)."""
        d = df[(df.dataset == "mini_sparse") & (df.bench == "RWNV")].set_index("engine")
        assert d.loc["GraSorw", "wall_s"] < d.loc["SOGW", "wall_s"]

    def test_dense_crossover(self, df):
        """On the dense cache-resident graph the baselines catch up or win
        (paper: RandomG4/5, SBM — GraSorw's protocol floor dominates)."""
        d = df[(df.dataset == "mini_dense") & (df.bench == "RWNV")].set_index("engine")
        sparse = df[(df.dataset == "mini_sparse") & (df.bench == "RWNV")].set_index("engine")
        ratio_dense = d.loc["GraSorw", "wall_s"] / d.loc["SOGW", "wall_s"]
        ratio_sparse = sparse.loc["GraSorw", "wall_s"] / sparse.loc["SOGW", "wall_s"]
        assert ratio_dense > ratio_sparse  # advantage shrinks with density


class TestTable7:
    def test_structure(self, spark):
        df = T.run_table7(spark, datasets=("mini_social",))
        assert list(df.engine) == ["GraphWalker", "GraSorw-No-LBL", "GraSorw"]
        assert (df.vertex_io_num == 0).all()  # first-order: no vertex I/O

    def test_lbl_io_in_range(self, spark):
        """At toy scale the learned switch can misfire on boundary blocks,
        so we only bound it near the pure-full cost; the real lite run in
        EXPERIMENTS.md shows the paper's 85–99% block-I/O-time ratio."""
        df = T.run_table7(spark, datasets=("mini_social",)).set_index("engine")
        io = df["block_io_s"] + df["ondemand_io_s"]
        assert io.loc["GraSorw"] <= 1.6 * io.loc["GraSorw-No-LBL"]
        assert df.loc["GraSorw", "block_io_num"] <= df.loc["GraSorw-No-LBL", "block_io_num"]


class TestTable8:
    def test_structure_and_iteration_wins(self, spark):
        df = T.run_table8(spark, datasets=("mini_social",)).set_index("engine")
        assert set(df.index) == {"alphabet", "iteration", "min_height", "max_sum", "graphwalker"}
        assert df.loc["iteration", "block_io_num"] <= df.loc["alphabet", "block_io_num"]
        assert df.loc["iteration", "block_io_num"] <= df.loc["min_height", "block_io_num"]


class TestE2E:
    def test_grasorw_fastest_on_disk_resident(self, spark):
        df = T.run_e2e(spark, datasets=["mini_social"])
        d = df[df.bench == "RWNV"].set_index("engine")
        assert d.loc["GraSorw", "wall_s"] < d.loc["SOGW", "wall_s"]
        assert d.loc["GraSorw", "wall_s"] < d.loc["SGSC", "wall_s"]
        assert d.loc["GraSorw", "speedup_vs_SOGW"] > 1.0

    def test_vertex_io_eliminated(self, spark):
        df = T.run_e2e(spark, datasets=["mini_social"])
        assert (df[df.engine == "GraSorw"].vertex_io_num == 0).all()
        assert (df[df.engine == "SOGW"].vertex_io_num > 0).all()


class TestStatsTables:
    def test_table2_shape(self, spark):
        df = T.run_table2(spark)
        assert set(df.dataset) == set(MINI2)
        assert {"V", "E_undirected", "csr_bytes", "n_blocks", "edge_cut"} <= set(df.columns)

    def test_table5_shape(self, spark):
        df = T.run_table5(spark)
        assert set(df.dataset) == set(MINI5)

    def test_format_table(self):
        out = T.format_table(pd.DataFrame({"a": [1]}), "Table X")
        assert "Table X" in out and "a" in out
