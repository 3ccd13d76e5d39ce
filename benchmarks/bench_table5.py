"""Benchmark for Table 5: constructive lower-bound reductions."""
import pytest

from repro.tables import table5


@pytest.mark.benchmark(group="table5")
def test_bench_table5(spark, benchmark):
    out = benchmark.pedantic(lambda: table5(spark, seed=0), rounds=1, iterations=1)
    assert out["solved"].all()
