"""Benchmark for Table 1: insertion-only Algorithm 2 across c (Thm 3.2)."""
import pytest

from repro.tables import table1


@pytest.mark.benchmark(group="table1")
def test_bench_table1(spark, benchmark):
    out = benchmark.pedantic(
        lambda: table1(spark, n=4096, d=256, cs=(2, 3, 4, 6, 8), seed=0),
        rounds=1,
        iterations=1,
    )
    assert out["success"].all()
    assert (out["measured_words"] < out["exact_baseline_words"]).all()
