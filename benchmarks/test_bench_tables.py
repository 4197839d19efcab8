"""Benchmarks: regenerate every evaluation-section table (paper §7).

One benchmark per table. Each runs the table's full experiment on the lite
datasets, asserts the paper's qualitative shape, and writes the table to
``results/`` (EXPERIMENTS.md records these next to the paper's numbers).
"""
import pytest

from repro.core import tables as T

from .common import run_and_save


@pytest.mark.benchmark(group="table2")
def test_table2_dataset_stats(spark, benchmark):
    df = run_and_save(
        benchmark, lambda: T.run_table2(spark), "table2",
        "Table 2 — dataset and partition statistics (lite)",
    )
    assert len(df) == 6
    # UK-analogue reproduces the paper's low sequential edge-cut regime.
    d = df.set_index("dataset")
    assert d.loc["uk_lite", "edge_cut"] < 0.45
    assert d.loc["tw_lite", "edge_cut"] > 0.7


@pytest.mark.benchmark(group="table3")
def test_table3_engines(spark, benchmark):
    df = run_and_save(
        benchmark, lambda: T.run_table3(spark), "table3",
        "Table 3 — PB vs Bi-Block (RWNV + PRNV, lite)",
    )
    bb = df[df.engine == "Bi-Block"]
    # Triangular scheduling cuts block I/Os roughly in half (Eq. 3; the
    # paper reports 34–61%). The low-edge-cut web graphs (uk/cw) sit closer
    # to 1 at lite scale because walks rarely cross blocks there.
    assert (bb.block_io_num_ratio < 0.95).all()
    assert bb.block_io_num_ratio.median() < 0.65
    # ... and wall time drops on every dataset/benchmark (paper: 16–60%).
    assert (bb.wall_s_ratio < 1.0).all()
    # Neither engine performs light vertex I/Os.
    assert (df.vertex_io_num == 0).all()


@pytest.mark.benchmark(group="table4")
def test_table4_loading(spark, benchmark):
    df = run_and_save(
        benchmark, lambda: T.run_table4(spark), "table4",
        "Table 4 — full vs learning-based load x partition (RWNV, lite)",
    )
    piv = df.pivot_table(
        index=["dataset", "partition"], columns="loading",
        values=["wall_s", "block_io_num"],
    )
    # Learning-based loading never increases full-block loads …
    assert (
        piv[("block_io_num", "Learning-based")]
        <= piv[("block_io_num", "Pure Full Load")]
    ).all()
    # … and does not lose wall time overall (paper: 6–38% reduction).
    assert (
        piv[("wall_s", "Learning-based")] <= 1.05 * piv[("wall_s", "Pure Full Load")]
    ).all()
    # METIS-lite reduces block I/O where sequential order hides structure
    # (paper: 28–72% fewer block I/Os under METIS). uk_lite is reported but
    # not asserted — its sequential order is already METIS-like.
    full = df[df.loading == "Pure Full Load"].pivot_table(
        index="dataset", columns="partition", values="block_io_num"
    )
    for name in ("tw_lite", "ukx_lite"):
        assert full.loc[name, "metis"] < full.loc[name, "seq"], name


@pytest.mark.benchmark(group="table5")
def test_table5_synth_stats(spark, benchmark):
    df = run_and_save(
        benchmark, lambda: T.run_table5(spark), "table5",
        "Table 5 — synthetic graph statistics (lite)",
    )
    assert len(df) == 11
    d = df.set_index("dataset")
    # density family: fixed E, increasing average degree
    degs = [d.loc[f"randomg{i}_lite", "avg_deg"] for i in range(1, 6)]
    assert degs == sorted(degs)


@pytest.mark.benchmark(group="table6")
def test_table6_synthetic_distributions(spark, benchmark):
    df = run_and_save(
        benchmark, lambda: T.run_table6(spark), "table6",
        "Table 6 — SOGW vs SGSC vs GraSorw on synthetic graphs (lite)",
    )
    w = df[df.bench == "RWNV"].pivot_table(index="dataset", columns="engine", values="wall_s")
    ratio = w["GraSorw"] / w["SOGW"]
    # Sparse/skew family: GraSorw clearly faster (paper: 4.6–6.1×).
    for name in ("circulant_lite", "randomg_lite", "basf_lite", "randomg1_lite"):
        assert ratio.loc[name] < 0.7, (name, ratio.loc[name])
    # Dense end of the density sweep: the advantage collapses or inverts
    # (paper: 0.47–0.7× on RandomG4/5).
    assert ratio.loc["randomg5_lite"] > 2 * ratio.loc["randomg1_lite"]
    # PRNV keeps GraSorw competitive even on dense graphs (paper §7.7).
    wp = df[df.bench == "PRNV"].pivot_table(index="dataset", columns="engine", values="wall_s")
    assert (wp["GraSorw"] / wp["SOGW"]).loc["randomg1_lite"] < 0.7


@pytest.mark.benchmark(group="table7")
def test_table7_first_order(spark, benchmark):
    df = run_and_save(
        benchmark, lambda: T.run_table7(spark), "table7",
        "Table 7 — first-order DeepWalk engines (lite)",
    )
    assert (df.vertex_io_num == 0).all()
    for ds, g in df.groupby("dataset"):
        d = g.set_index("engine")
        # GraSorw's block I/O time is the least of the three (paper: 85–99%
        # of GraphWalker's), and iteration scheduling is competitive.
        io = d["block_io_s"] + d["ondemand_io_s"]
        assert io.loc["GraSorw"] <= 1.05 * io.min(), ds
        assert d.loc["GraSorw-No-LBL", "wall_s"] <= 1.3 * d.loc["GraphWalker", "wall_s"], ds


@pytest.mark.benchmark(group="table8")
def test_table8_scheduling(spark, benchmark):
    df = run_and_save(
        benchmark, lambda: T.run_table8(spark), "table8",
        "Table 8 — current-block scheduling strategies (DeepWalk, lite)",
    )
    for ds, g in df.groupby("dataset"):
        d = g.set_index("engine")
        # Appendix A: Iteration-based loads the fewest (or near-fewest)
        # blocks; Min-Height is consistently the worst performer.
        assert d.loc["iteration", "block_io_num"] <= 1.1 * d["block_io_num"].min(), ds
        assert d.loc["min_height", "block_io_num"] >= d.loc["iteration", "block_io_num"], ds


@pytest.mark.benchmark(group="e2e")
def test_e2e_performance(spark, benchmark):
    df = run_and_save(
        benchmark, lambda: T.run_e2e(spark), "e2e",
        "End-to-end — SOGW vs SGSC vs GraSorw (Fig. 8 as a table, lite)",
    )
    g = df[df.engine == "GraSorw"]
    # GraSorw wins end-to-end on every disk-resident graph, both tasks
    # (paper: 1.43×–95×).
    assert (g.speedup_vs_SOGW > 1.0).all()
    # The mechanism: second-order vertex I/Os are eliminated entirely.
    assert (g.vertex_io_num == 0).all()
    assert (df[df.engine == "SOGW"].vertex_io_num > 0).all()
