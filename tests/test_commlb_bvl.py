"""Bit-Vector Learning: instance law, reduction graph, protocol run."""
import numpy as np
import pytest

from repro.commlb import bit_vector_learning as bvl


@pytest.mark.parametrize("p,n", [(2, 64), (3, 256), (4, 512), (5, 625)])
def test_instance_set_sizes(p, n):
    inst = bvl.make_instance(p, n, k=8, seed=1)
    assert len(inst.X) == p
    assert len(inst.X[0]) == n
    assert len(inst.X[-1]) == 1
    for i in range(1, p):
        expect = max(1, round(n ** (1 - i / (p - 1))))
        assert len(inst.X[i]) == min(expect, len(inst.X[i - 1]))


def test_instance_nesting():
    inst = bvl.make_instance(4, 512, k=8, seed=2)
    for i in range(1, 4):
        assert set(inst.X[i]) <= set(inst.X[i - 1])


def test_strings_only_for_owned_indices():
    inst = bvl.make_instance(3, 64, k=8, seed=3)
    for (i, j), bits in inst.Y.items():
        assert j in set(inst.X[i])
        assert len(bits) == 8
        assert set(np.unique(bits)) <= {0, 1}


def test_z_string_concatenation():
    inst = bvl.make_instance(3, 64, k=4, seed=4)
    j = int(inst.X[2][0])  # owned by all three parties
    assert len(inst.z_string(j)) == 12
    j1 = next(x for x in inst.X[0] if x not in set(inst.X[1]))
    assert len(inst.z_string(int(j1))) == 4


def test_party_stream_encodes_bits():
    inst = bvl.make_instance(3, 16, k=4, seed=5)
    s = bvl.party_stream(inst, 1)
    for row in s.itertuples():
        party, j, bit = bvl.decode_edge(int(row.b), inst.k)
        assert party == 1
        assert inst.Y[(1, int(row.a))][j] == bit


def test_graph_max_degree_is_kp():
    inst = bvl.make_instance(3, 64, k=8, seed=6)
    import pandas as pd

    allp = pd.concat([bvl.party_stream(inst, i) for i in range(3)])
    deg = allp.groupby("a").size()
    assert deg.max() == 8 * 3
    assert deg.idxmax() == int(inst.X[2][0])


def test_decode_edge_roundtrip():
    k = 8
    for party in range(3):
        for j in range(k):
            for bit in (0, 1):
                b = 2 * k * party + 2 * j + bit
                assert bvl.decode_edge(b, k) == (party, j, bit)


@pytest.mark.parametrize("p,n,c", [(3, 256, 2), (4, 512, 3)])
def test_protocol_solves_bvl(p, n, c):
    """The constructive Theorem 4.8 reduction: Algorithm 2 with c < p
    learns > k bits of some Z^I, all correct."""
    inst = bvl.make_instance(p, n, k=16, seed=7)
    out = bvl.solve_with_algorithm(inst, c=c, seed=8)
    assert out["success"]
    assert out["bits_correct"] == out["bits_learned"] >= out["bits_required"]


def test_message_size_measured():
    inst = bvl.make_instance(3, 256, k=16, seed=9)
    out = bvl.solve_with_algorithm(inst, c=2, seed=10)
    assert out["max_msg_bytes"] > 0
