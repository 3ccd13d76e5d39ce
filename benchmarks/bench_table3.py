"""Benchmark for Table 3: insertion-deletion Algorithm 3 across c (Thm 5.4)."""
import pytest

from repro.tables import table3


@pytest.mark.benchmark(group="table3")
def test_bench_table3(spark, benchmark):
    out = benchmark.pedantic(
        lambda: table3(spark, n=256, m=512, d=32, cs=(2, 4, 8, 16, 32), seed=0),
        rounds=1,
        iterations=1,
    )
    one = out[out["scenario"] == "one_heavy"]
    assert one["success"].all()
