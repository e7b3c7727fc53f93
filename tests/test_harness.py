"""Harness tests: run_cell dispatch, statuses, and table running on the
tiny test graphs (the bench graphs are exercised by benchmarks/)."""
import pytest

from repro import paper_numbers as paper
from repro.harness import fmt_cell, fmt_paper, get_csr, run_cell, run_table, sl_pattern
from repro.timeout import CellResult


def test_get_csr_cached():
    assert get_csr("tiny") is get_csr("tiny")


def test_sl_patterns():
    assert sl_pattern("diamond").name == "diamond"
    assert sl_pattern("4-cycle").name == "4-cycle"


def test_run_cell_tc(spark):
    r = run_cell(spark, "G2Miner", ("tc",), "tiny", timeout_s=60)
    assert r.status == "ok" and r.value > 0


def test_run_cell_kcl(spark):
    r = run_cell(spark, "G2Miner", ("kcl", 4), "tiny", timeout_s=60)
    assert r.status == "ok"


def test_run_cell_sl(spark):
    r = run_cell(spark, "GraphZero", ("sl", "diamond"), "tiny", timeout_s=60)
    assert r.status == "ok"


def test_run_cell_mc(spark):
    r = run_cell(spark, "G2Miner", ("mc", 3), "tiny", timeout_s=60)
    assert r.status == "ok" and len(r.value) == 2


def test_run_cell_fsm(spark):
    r = run_cell(spark, "G2Miner", ("fsm", 3), "tiny_labeled", timeout_s=60)
    assert r.status == "ok" and r.value > 0


def test_run_cell_counting(spark):
    r = run_cell(spark, "G2Miner", ("counting", "diamond"), "tiny", timeout_s=60)
    assert r.status == "ok"


def test_unsupported_workload_is_na(spark):
    r = run_cell(spark, "PBE", ("mc", 3), "tiny")
    assert r.status == "n/a"
    r = run_cell(spark, "Pangolin", ("sl", "diamond"), "tiny")
    assert r.status == "n/a"


def test_run_table_frame(spark):
    df = run_table(
        spark,
        [("G2Miner", ("tc",), "tiny"), ("GraphZero", ("tc",), "tiny")],
        timeout_s=60,
    )
    assert list(df.columns) == ["system", "workload", "graph", "status", "seconds", "value"]
    assert (df["status"] == "ok").all()
    assert df["value"].nunique() == 1, "systems agree"


def test_fmt_helpers():
    assert fmt_cell(CellResult(status="ok", seconds=1.234)) == "1.23"
    assert fmt_cell(CellResult(status="OoM")) == "OoM"
    assert fmt_paper(paper.OOM) == "OoM"
    assert fmt_paper(5.1) == "5.1"


def test_paper_tables_well_formed():
    for tbl in [paper.TABLE4, paper.TABLE5, paper.TABLE6, paper.TABLE7,
                paper.TABLE8, paper.TABLE9]:
        for system, cells in tbl.items():
            assert cells, system
            for v in cells.values():
                assert isinstance(v, (int, float)) or v in (paper.OOM, paper.TO)


def test_sigma_scaling_table():
    assert paper.SIGMA_SCALE == {300: 3, 500: 5, 1000: 10, 5000: 50}
