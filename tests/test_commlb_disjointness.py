"""Set-Disjointness reduction (Theorem 4.1), run constructively."""
import numpy as np
import pytest

from repro.commlb import set_disjointness as disj


def test_instance_disjoint_promise():
    inst = disj.make_instance(3, 64, set_size=8, intersecting=False, seed=1)
    for i in range(3):
        for j in range(i + 1, 3):
            assert not set(inst.sets[i]) & set(inst.sets[j])


def test_instance_unique_intersection():
    inst = disj.make_instance(3, 64, set_size=8, intersecting=True, seed=2)
    inter = set(inst.sets[0]) & set(inst.sets[1]) & set(inst.sets[2])
    assert inter == {inst.common}
    for i in range(3):
        for j in range(i + 1, 3):
            assert set(inst.sets[i]) & set(inst.sets[j]) == {inst.common}


def test_instance_rejects_oversized():
    with pytest.raises(ValueError):
        disj.make_instance(4, 10, set_size=5, intersecting=False)


def test_party_stream_blocks():
    inst = disj.make_instance(2, 32, set_size=4, intersecting=True, seed=3)
    k = 5
    s0 = disj.party_stream(inst, 0, k)
    s1 = disj.party_stream(inst, 1, k)
    assert set(s0["b"]) == set(range(5))
    assert set(s1["b"]) == set(range(5, 10))
    assert s0.groupby("a").size().eq(k).all()


def test_graph_degrees_encode_answer():
    import pandas as pd

    k = 4
    for inter in (False, True):
        inst = disj.make_instance(3, 64, set_size=6, intersecting=inter, seed=4)
        allp = pd.concat([disj.party_stream(inst, i, k) for i in range(3)])
        delta = allp.groupby("a").size().max()
        assert delta == (k * 3 if inter else k)


@pytest.mark.parametrize("p", [2, 3, 4])
@pytest.mark.parametrize("intersecting", [False, True])
def test_protocol_decides_correctly(p, intersecting):
    inst = disj.make_instance(
        p, 128, set_size=8, intersecting=intersecting, seed=5 + p
    )
    # completeness needs kp/c >= k+1, i.e. c < p (c=1 is the exact algorithm)
    out = disj.solve_with_algorithm(inst, k=max(4, p), c=max(1, p - 1), seed=6)
    assert out["correct"]


def test_repeated_trials_all_correct():
    for t in range(10):
        inst = disj.make_instance(3, 128, set_size=8, intersecting=t % 2 == 0, seed=t)
        out = disj.solve_with_algorithm(inst, k=4, c=2, seed=t)
        assert out["correct"], f"trial {t}"
