"""Benchmark for Table 2: success probability sweep (Lemma 3.1/Thm 3.2)."""
import pytest

from repro.tables import table2


@pytest.mark.benchmark(group="table2")
def test_bench_table2(spark, benchmark):
    out = benchmark.pedantic(
        lambda: table2(spark, n=1024, d=128, c=4, trials=20, seed=0),
        rounds=1,
        iterations=1,
    )
    assert (out["success_rate"] >= 0.9).all()
