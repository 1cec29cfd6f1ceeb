"""Benchmark: Table IV — the mono-lingual sweep (DYW100K + SRPRS DBP-WD/
DBP-YG) including the CEAFF w/o M^l row."""
import pytest

from repro.evalx.tables import Harness, format_rows


@pytest.mark.benchmark(group="table4")
def test_bench_table4(benchmark, spark, bench_pairs):
    h = Harness(spark, n_pairs=bench_pairs)

    def run():
        return h.table4()

    rows = benchmark.pedantic(run, rounds=1, iterations=1)
    print("\n== Table IV (mono-lingual accuracy, measured/paper) ==")
    print(format_rows(rows))
    by = {(r["method"], r["dataset"]): r["measured"] for r in rows}
    for (m, ds), v in by.items():
        if m not in ("ceaff",) and v is not None:
            assert by[("ceaff", ds)] >= v - 1e-9, (m, ds)
    # string-level feature saturates mono-lingual alignment (paper: all 1.0)
    assert all(by[("ceaff", ds)] >= 0.99 for ds in {d for _, d in by})
