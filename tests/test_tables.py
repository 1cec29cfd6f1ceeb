"""Table harnesses: row structure, paper-number bookkeeping, formatting,
and the cheap end of the reproduction (Table II at test scale; Table V's
config grid on a stubbed harness)."""
import numpy as np
import pytest

from repro.core.config import CEAFFConfig
from repro.evalx import paper_numbers as paper
from repro.evalx.tables import ABLATIONS, TABLE5_DATASETS, TABLE6_DATASETS, Harness, format_rows
from repro.kgdata.benchmarks import BENCHMARKS


def test_paper_tables_complete():
    assert set(paper.TABLE2) == set(BENCHMARKS)
    assert len(paper.TABLE3) == 11 and all(len(v) == 5 for v in paper.TABLE3.values())
    assert len(paper.TABLE4) == 13
    assert len(paper.TABLE5) == 12 and all(len(v) == 5 for v in paper.TABLE5.values())
    assert len(paper.TABLE6) == 12


def test_ablation_grid_is_table5():
    assert set(ABLATIONS) == set(paper.TABLE5)
    assert ABLATIONS["ceaff"] == CEAFFConfig()
    assert not ABLATIONS["wo_c"].collective
    assert not ABLATIONS["wo_theta"].theta_override
    assert ABLATIONS["lr"].weighting == "lr"
    assert ABLATIONS["wo_c_ml"] == CEAFFConfig(collective=False, use_string=False)


def test_table5_matches_paper_row_order():
    assert TABLE5_DATASETS == ("srprs_en_fr", "srprs_en_de", "srprs_dbp_wd", "srprs_dbp_yg", "dbp15k_zh_en")
    assert TABLE6_DATASETS == ("dbp15k_zh_en", "dbp15k_ja_en", "dbp15k_fr_en")


@pytest.fixture(scope="module")
def harness():
    return Harness(None, n_pairs=60, use_spark=False)


def test_table2_rows(harness):
    rows = harness.table2()
    assert len(rows) == 9
    for r in rows:
        assert r["n_links"] == 60
        assert r["paper_n_links"] in (15_000, 100_000)
        assert r["kg1_triples"] > 0
        # scaled instance stays (much) smaller than the paper's dataset
        assert r["kg1_triples"] < r["paper_kg1_triples"]


def test_harness_caches_bundles(harness):
    b1 = harness.bundle("srprs_dbp_wd")
    b2 = harness.bundle("srprs_dbp_wd")
    assert b1 is b2


def test_harness_caches_baseline_sims(harness):
    s1 = harness.baseline_sim("gcn_align", "srprs_dbp_wd")
    s2 = harness.baseline_sim("gcn_align", "srprs_dbp_wd")
    assert s1 is s2


def test_ceaff_accuracy_in_range(harness):
    acc = harness.ceaff_accuracy("srprs_dbp_wd")
    assert 0.0 <= acc <= 1.0


def test_format_rows_pivot():
    rows = [
        {"method": "a", "dataset": "d1", "measured": 0.5, "paper": 0.7},
        {"method": "a", "dataset": "d2", "measured": None, "paper": 0.9},
    ]
    out = format_rows(rows)
    assert "0.500/0.700" in out
    assert "-/0.900" in out


def test_format_rows_flat():
    rows = [{"x": 1, "y": 0.25}, {"x": 2, "y": None}]
    out = format_rows(rows, pivot=None)
    assert "0.250" in out and "-" in out


@pytest.mark.slow
def test_table5_shape_small(harness):
    """The ablation grid at tiny scale: structure of rows + the robust
    shape claims (CEAFF tops its own ablations on mono-lingual data)."""
    rows = harness.table5()
    assert len(rows) == 12 * 5
    by = {(r["method"], r["dataset"]): r["measured"] for r in rows}
    for ds in ("srprs_dbp_wd", "srprs_dbp_yg"):
        assert by[("ceaff", ds)] >= by[("wo_ml", ds)]
        assert by[("ceaff", ds)] >= by[("wo_c_ml", ds)]
    for (m, ds), v in by.items():
        assert 0.0 <= v <= 1.0, (m, ds)


@pytest.mark.slow
def test_table6_shape_small(harness):
    rows = harness.table6()
    methods = {r["method"] for r in rows}
    assert "ceaff" in methods and "ceaff_wo_c" in methods
    for r in rows:
        if r["method"] == "ceaff":
            assert r["hits10"] is None and r["mrr"] is None
        else:
            assert 0 <= r["hits1"] <= r["hits10"] <= 1
