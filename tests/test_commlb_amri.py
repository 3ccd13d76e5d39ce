"""Augmented-Matrix-Row-Index reduction (Lemma 6.3), run constructively."""
import numpy as np
import pytest

from repro.commlb import augmented_matrix_row_index as amri


def test_instance_shapes():
    inst = amri.make_instance(8, 16, 3, seed=1)
    assert inst.X.shape == (8, 16)
    assert 0 <= inst.J < 8
    assert set(inst.known) == set(range(8)) - {inst.J}
    for cols in inst.known.values():
        assert len(cols) == 16 - 3
        assert len(np.unique(cols)) == len(cols)


def test_instance_matrix_binary():
    inst = amri.make_instance(8, 16, 3, seed=2)
    assert set(np.unique(inst.X)) <= {0, 1}


def test_single_repetition_learns_only_true_ones():
    inst = amri.make_instance(12, 32, 7, seed=3)
    learned, msg = amri._one_repetition(inst.X, inst, c=2, rep_seed=7)
    assert msg > 0
    truth = set(np.nonzero(inst.X[inst.J])[0].tolist())
    assert learned <= truth
    # if the run reported anything, it reported at least d/c positions
    assert learned == set() or len(learned) >= (32 // 2) // 2


@pytest.mark.parametrize("seed", [4, 5])
def test_protocol_reconstructs_row(seed):
    inst = amri.make_instance(12, 32, 7, seed=seed)  # n=12, m=32 (d=16), c=2
    out = amri.solve_with_algorithm(inst, c=2, seed=seed * 11)
    assert out["correct"], (
        f"ones={out['ones_learned']} zeros={out['zeros_learned']} "
        f"true_ones={int(inst.X[inst.J].sum())}"
    )


def test_protocol_handles_sparse_target_row():
    """Row J with < d ones exercises the inverted-matrix path."""
    inst = amri.make_instance(10, 32, 7, seed=6)
    inst.X[inst.J] = 0
    inst.X[inst.J, :5] = 1  # 5 ones < d = 16
    out = amri.solve_with_algorithm(inst, c=2, seed=9)
    assert out["correct"]
    assert out["ones_learned"] < 16


def test_protocol_handles_dense_target_row():
    inst = amri.make_instance(10, 32, 7, seed=7)
    inst.X[inst.J] = 1
    inst.X[inst.J, :4] = 0  # 28 ones >= d = 16
    out = amri.solve_with_algorithm(inst, c=2, seed=10)
    assert out["correct"]


def test_message_bytes_accumulate_over_reps():
    inst = amri.make_instance(8, 16, 3, seed=8)
    out = amri.solve_with_algorithm(inst, c=2, reps=2, seed=11)
    single = amri._one_repetition(inst.X, inst, c=2, rep_seed=11)[1]
    assert out["message_bytes"] >= 2 * single
