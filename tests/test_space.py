"""Space-formula sanity: monotonicity, regimes, crossovers."""
import math

import pytest

from repro import space


def test_reservoir_size_formula():
    assert space.reservoir_size(1024, 2) == math.ceil(math.log(1024) * 32)
    assert space.reservoir_size(1, 2) == 1


def test_reservoir_size_decreases_with_c():
    assert space.reservoir_size(4096, 2) > space.reservoir_size(4096, 4) > space.reservoir_size(4096, 8)


def test_thm32_beats_exact_for_large_c():
    n, d = 4096, 256
    assert space.thm32_words(n, d, 4) < space.exact_words(n, d)


def test_thm32_decreasing_in_c():
    n, d = 4096, 256
    vals = [space.thm32_words(n, d, c) for c in (2, 3, 4, 6, 8)]
    assert all(a > b for a, b in zip(vals, vals[1:]))


def test_thm54_regime_switch():
    """dn/c^2 for c <= sqrt(n), sqrt(n)d/c beyond: continuous-ish decay."""
    n, d = 256, 32
    vals = [space.thm54_words(n, d, c) for c in (2, 4, 8, 16, 32, 64)]
    assert all(a > b for a, b in zip(vals, vals[1:]))


def test_turnstile_costs_more_than_insertion_only():
    """The paper's separation: insertion-deletion needs ~n*d/c^2, far above
    the insertion-only ~n + n^{1/c} d for moderate c."""
    n, d, c = 4096, 256, 2
    assert space.thm54_words(n, d, c) > space.thm32_words(n, d, c)


def test_lower_bounds_below_upper_bounds():
    n, d, c = 1024, 64, 2
    assert space.thm48_lb_words(n, d, c, p=3) <= space.thm32_words(n, d, c)
    assert space.thm64_lb_words(n, d, c) <= space.thm54_words(n, d, c)


def test_thm48_lb_grows_with_parties_shrinking():
    n, d, c = 4096, 64, 2
    assert space.thm48_lb_words(n, d, c, p=2) > space.thm48_lb_words(n, d, c, p=4)


@pytest.mark.parametrize("n", [64, 1024, 65536])
def test_formulas_positive(n):
    for c in (2, 4, 8):
        assert space.thm32_words(n, 16, c) > 0
        assert space.thm54_words(n, 16, c) > 0
        assert space.thm64_lb_words(n, 16, c) > 0
