"""Word-cost space accounting and the paper's space-bound formulas.

The paper accounts space in bits with ``O(log n)`` bits per stored edge,
counter, or vertex id. We normalise to *machine words* (1 word = one
edge / one counter / one vertex id / one sketch cell), so the paper's
``O(n log n + n^{1/c} d log^2 n)``-bit bound becomes
``n + n^{1/c} d ln n`` words with all constants set to 1 and
``log := ln``. Tables report measured words next to these formulas; the
*shape* (scaling in ``n``, ``c``, ``d``) is what reproduction checks.
"""
from __future__ import annotations

import math


def reservoir_size(n: int, c: int) -> int:
    """Algorithm 2's reservoir size ``s = ceil(ln(n) * n^{1/c})``."""
    if n < 2:
        return 1
    return math.ceil(math.log(n) * n ** (1.0 / c))


def thm32_words(n: int, d: int, c: int) -> int:
    """Theorem 3.2 insertion-only bound, in words.

    ``n`` words of degree counters plus ``c`` runs each storing at most
    ``s * d/c`` edges and ``s`` reservoir slots, ``s = ceil(n^{1/c} ln n)``.
    """
    s = reservoir_size(n, c)
    return n + c * (s + s * max(1, d // c))


def exact_words(n: int, d: int) -> int:
    """The trivial exact algorithm: first ``min(deg, d)`` edges per vertex."""
    return n * d


def thm54_words(n: int, d: int, c: int) -> float:
    """Theorem 5.4 insertion-deletion bound, in words (constants = 1).

    ``Õ(dn/c^2)`` for ``c <= sqrt(n)`` and ``Õ(sqrt(n) d / c)`` beyond;
    we expand the polylog as the sketch-cell count the algorithm
    actually allocates: each l0 sampler costs ``~log(nm)`` cells.
    """
    x = max(n / c, math.sqrt(n))
    ln_n = math.log(max(n, 2))
    ln_nm = math.log(max(n * n, 2))
    vertex = min(n, x * ln_n) * (d / c) * ln_n
    edge = (n * d / c) * (1 / x + 1 / c) * ln_nm
    return vertex + edge


def thm48_lb_words(n: int, d: int, c: int, p: int) -> float:
    """Theorem 4.8 insertion-only lower bound ``Omega(d n^{1/(p-1)} / c^2)``."""
    return d * n ** (1.0 / (p - 1)) / c**2


def thm64_lb_words(n: int, d: int, c: int) -> float:
    """Theorem 6.4 turnstile lower bound ``Omega(nd / (c^2 log n))``."""
    return n * d / (c**2 * math.log(max(n, 2)))
