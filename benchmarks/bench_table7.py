"""Benchmark for Table 7: witness applications at ~SF 0.1 event scale."""
import pytest

from repro.tables import table7


@pytest.mark.benchmark(group="table7")
def test_bench_table7(spark, benchmark):
    out = benchmark.pedantic(
        lambda: table7(spark, n_events=100_000, attack_frac=0.05, cs=(2, 4), seed=0),
        rounds=1,
        iterations=1,
    )
    nd = out[out["method"].str.startswith("neighborhood")]
    assert (nd["witnesses"] >= nd["witness_guarantee"]).all()
