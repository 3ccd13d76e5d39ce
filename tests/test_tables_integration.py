"""Integration: every table harness runs at reduced scale and its rows
exhibit the paper's qualitative shape (who wins, how things scale)."""
import pytest

from repro import tables


@pytest.fixture(scope="module")
def t1(spark):
    return tables.table1(spark, n=512, d=64, cs=(2, 3, 4), avg_deg=4.0, seed=1)


def test_table1_success_and_validity(t1):
    assert t1["success"].all()
    assert (t1["out_size"] >= t1["required_d_over_c"]).all()
    assert t1["valid_output"].all()


def test_table1_space_shape(t1):
    # measured within the paper bound; bound decreasing in c; exact worst
    assert (t1["measured_words"] <= t1["paper_bound_words"]).all()
    assert t1["paper_bound_words"].is_monotonic_decreasing
    assert (t1["measured_words"] < t1["exact_baseline_words"]).all()
    assert (t1["saving_vs_exact"] > 1).all()


def test_table2_success_rates(spark):
    t2 = tables.table2(
        spark, n=256, d=32, c=3, trials=5,
        orderings=("random", "heavy_last"), profiles=("uniform",),
    )
    assert len(t2) == 2
    assert (t2["success_rate"] >= 0.8).all()
    assert (t2["mean_out_size"] >= t2["required"]).all()


def test_table3_shape(spark):
    t3 = tables.table3(
        spark, n=128, m=256, d=16, cs=(2, 4, 8), scenarios=("one_heavy",),
        seed=2,
    )
    assert t3["success"].all()
    assert (t3["out_size"] >= t3["required_d_over_c"]).all()
    # turnstile space far above the insertion-only bound at same (n,d,c)
    assert (t3["measured_words"] > t3["ins_only_bound_words"]).all()
    # and decreasing in c
    m = t3["measured_words"].tolist()
    assert m[0] > m[1] > m[2]


def test_table3_many_heavy_vertex_strategy(spark):
    t3 = tables.table3(
        spark, n=128, m=256, d=16, cs=(4,), scenarios=("many_heavy",), seed=3
    )
    assert bool(t3.loc[0, "vertex_strategy_ok"])


def test_table4_sampler_quality(spark):
    t4 = tables.table4(spark, dims=(1 << 10, 1 << 14), support=32,
                       num_samplers=256, seed=4)
    assert (t4["success_rate"] > 0.3).all()
    assert (t4["recovered_in_support"] == 1.0).all()
    assert (t4["tv_from_uniform"] < 0.5).all()


def test_table5_reductions_solve(spark):
    t5 = tables.table5(
        spark,
        bvl_params=((3, 256, 16, 2),),
        disj_params=((3, 128, 4),),
        amri_params=((12, 16, 2),),
        seed=5,
    )
    assert t5["solved"].all()
    assert (t5["measured_msg_bytes"] > 0).all()


def test_table6_star_detection(spark):
    t6 = tables.table6(spark, ns=(256,), seed=6)
    assert (t6["found_star"] > 0).all()
    assert (t6["approx_ratio"] <= t6["paper_guarantee"]).all()


def test_table7_witness_guarantees(spark):
    t7 = tables.table7(spark, n_events=20_000, attack_frac=0.1, cs=(2,), seed=7)
    nd = t7[t7["method"].str.startswith("neighborhood")]
    assert nd["target_found"].all()
    assert (nd["witnesses"] >= nd["witness_guarantee"]).all()
    assert nd["witnesses_valid"].all()
    exact = t7[t7["method"].str.startswith("exact")]
    # exact costs the most space among DoS methods
    dos = t7[t7["app"] == "dos"]
    assert exact["space_words"].iloc[0] == dos["space_words"].max()


def test_table7_early_burst_separates_mg_from_nd(spark):
    """The paper's motivation made measurable: under the early-burst
    adversary Misra-Gries loses the target's witnesses, Algorithm 2
    still delivers its d/c guarantee."""
    t7 = tables.table7(spark, n_events=20_000, attack_frac=0.1, cs=(2,), seed=7)
    burst = t7[t7["app"] == "dos-early-burst"]
    nd = burst[burst["method"].str.startswith("neighborhood")].iloc[0]
    mg = burst[burst["method"].str.startswith("misra")].iloc[0]
    assert nd["target_found"] and nd["witnesses"] >= nd["witness_guarantee"]
    assert mg["witnesses"] < nd["witnesses"]
