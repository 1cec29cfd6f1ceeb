"""Benchmark: Table V — the 12-configuration ablation grid on the five
ablation datasets (fusion/matching sweeps over shared feature bundles)."""
import pytest

from repro.evalx.tables import Harness, format_rows


@pytest.mark.benchmark(group="table5")
def test_bench_table5(benchmark, spark, bench_pairs):
    h = Harness(spark, n_pairs=bench_pairs)

    def run():
        return h.table5()

    rows = benchmark.pedantic(run, rounds=1, iterations=1)
    print("\n== Table V (ablation, measured/paper) ==")
    print(format_rows(rows))
    by = {(r["method"], r["dataset"]): r["measured"] for r in rows}
    datasets = {d for _, d in by}
    for ds in datasets:
        # collective matching never hurts (Section VII-D)
        assert by[("ceaff", ds)] >= by[("wo_c", ds)] - 1e-9
        # the full model beats every single-feature removal without C
        assert by[("ceaff", ds)] >= by[("wo_c_ml", ds)] - 1e-9
