"""Benchmark: Table II — generating all nine KG-pair benchmarks and
collecting their statistics."""
import pytest

from repro.evalx.tables import Harness


@pytest.mark.benchmark(group="table2")
def test_bench_table2(benchmark, spark, bench_pairs):
    def run():
        h = Harness(spark, n_pairs=bench_pairs)
        rows = h.table2()
        assert len(rows) == 9
        return rows

    rows = benchmark.pedantic(run, rounds=1, iterations=1)
    assert all(r["n_links"] == bench_pairs for r in rows)
