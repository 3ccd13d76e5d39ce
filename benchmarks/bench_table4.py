"""Benchmark for Table 4: l0-sampler substrate quality."""
import pytest

from repro.tables import table4


@pytest.mark.benchmark(group="table4")
def test_bench_table4(spark, benchmark):
    out = benchmark.pedantic(
        lambda: table4(spark, dims=(1 << 10, 1 << 14, 1 << 17), seed=0),
        rounds=1,
        iterations=1,
    )
    assert (out["recovered_in_support"] == 1.0).all()
