"""Benchmark: Table III — the full cross-lingual sweep (feature dataflows,
ten trained competitor proxies, CEAFF) over five KG pairs, Spark paths on.

Prints the paper-vs-measured table so bench_output.txt doubles as the
reproduction record.
"""
import pytest

from repro.evalx.tables import Harness, format_rows


@pytest.mark.benchmark(group="table3")
def test_bench_table3(benchmark, spark, bench_pairs):
    h = Harness(spark, n_pairs=bench_pairs)

    def run():
        return h.table3()

    rows = benchmark.pedantic(run, rounds=1, iterations=1)
    print("\n== Table III (cross-lingual accuracy, measured/paper) ==")
    print(format_rows(rows))
    by = {(r["method"], r["dataset"]): r["measured"] for r in rows}
    # headline shape: CEAFF tops every baseline on every dataset.
    for (m, ds), v in by.items():
        if m != "ceaff" and v is not None:
            assert by[("ceaff", ds)] >= v - 1e-9, (m, ds)
