"""Job entrypoints: importable, wired to the right harness methods, and one
end-to-end smoke run of the cheapest job through spark-submit-style CLI."""
import subprocess
import sys
from pathlib import Path

import pytest

JOBS = Path(__file__).resolve().parent.parent / "jobs"


@pytest.mark.parametrize(
    "fname",
    [
        "table2_stats.py",
        "table3_crosslingual.py",
        "table4_monolingual.py",
        "table5_ablation.py",
        "table6_ranking.py",
    ],
)
def test_job_compiles(fname):
    src = (JOBS / fname).read_text()
    compile(src, fname, "exec")
    assert "table_main" in src


def test_common_table_main_signature():
    sys.path.insert(0, str(JOBS))
    try:
        import _common

        assert callable(_common.table_main)
        assert callable(_common.get_spark)
    finally:
        sys.path.remove(str(JOBS))


@pytest.mark.slow
def test_table2_job_end_to_end():
    """Run the stats job as a subprocess at tiny scale (own SparkSession)."""
    proc = subprocess.run(
        [sys.executable, str(JOBS / "table2_stats.py"), "--pairs", "40"],
        capture_output=True,
        text=True,
        timeout=600,
    )
    assert proc.returncode == 0, proc.stderr[-2000:]
    assert "Paper Table 2" in proc.stdout
    assert "dbp15k_zh_en" in proc.stdout
