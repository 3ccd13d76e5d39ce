"""Algorithm 1: ``Deg-Res-Sampling(d1, d2, s)`` (paper §3.1).

Maintains all A-vertex degrees; the moment a vertex's degree reaches
``d1`` it becomes a reservoir *candidate* and is kept with probability
``s/x`` (``x`` = number of candidates so far), evicting a uniform
member when full — the classic reservoir invariant over the candidate
set. For every vertex in the reservoir the next up-to-``d2`` incident
edges are collected (the triggering edge included, so a vertex of final
degree ``deg`` yields ``min(d2, deg - d1 + 1)`` neighbors).

The per-batch implementation is vectorised: running degrees via a
grouped cumulative count, then a sequential pass over only the (rare)
candidate events, then vectorised edge collection for current reservoir
members. Semantics are exactly the paper's per-edge loop — batching is
an execution detail, and ``tests/test_deg_res_sampling.py`` asserts
batch-size invariance.
"""
from __future__ import annotations

from typing import Optional

import numpy as np
import pandas as pd


class DegResSampling:
    """One run of Algorithm 1 over the canonical edge stream.

    Parameters
    ----------
    n : number of A-vertices (degree-array size).
    d1 : degree threshold at which a vertex becomes a candidate.
    d2 : number of incident edges to collect per sampled vertex.
    s : reservoir size.
    seed : RNG seed (``Coin(s/x)`` and evictions).
    shared_degrees : optional externally-maintained degree array; when
        given, this run neither stores nor updates degrees itself
        (Algorithm 2 shares one degree array across its ``c`` runs) and
        the caller must pass candidate rows to :meth:`ingest`.
    """

    def __init__(
        self,
        n: int,
        d1: int,
        d2: int,
        s: int,
        seed: int = 0,
        shared_degrees: np.ndarray | None = None,
    ) -> None:
        if d1 < 1 or d2 < 1 or s < 1:
            raise ValueError("d1, d2, s must be >= 1")
        self.n = n
        self.d1 = d1
        self.d2 = d2
        self.s = s
        self.rng = np.random.default_rng(seed)
        self._own_deg = shared_degrees is None
        self.deg = np.zeros(n, dtype=np.int64) if self._own_deg else shared_degrees
        self.x = 0  # candidates seen so far (paper's x)
        self._res: list[int] = []  # reservoir as list for O(1) uniform evict
        self._res_pos: dict[int, int] = {}
        self.collected: dict[int, list[int]] = {}  # vertex -> collected b's
        self.peak_collected = 0

    # ------------------------------------------------------------------ #

    def process_batch(self, batch: pd.DataFrame) -> None:
        """Standalone use: consume a micro-batch (insertion-only)."""
        if (batch["op"].to_numpy() != 1).any():
            raise ValueError("Deg-Res-Sampling handles insertion-only streams")
        a = batch["a"].to_numpy()
        b = batch["b"].to_numpy()
        occ = pd.Series(a).groupby(a).cumcount().to_numpy()
        new_deg = self.deg[a] + occ + 1
        cand_rows = np.flatnonzero(new_deg == self.d1)
        self.ingest(a, b, cand_rows)
        if self._own_deg:
            np.add.at(self.deg, a, 1)

    def ingest(self, a: np.ndarray, b: np.ndarray, cand_rows: np.ndarray) -> None:
        """Core per-batch step given precomputed candidate rows.

        ``cand_rows`` are batch row indices where a vertex's running
        degree hits ``d1`` exactly, in stream order.
        """
        enter_row: dict[int, int] = {}
        for i in cand_rows.tolist():
            v = int(a[i])
            self.x += 1
            if len(self._res) < self.s:
                self._insert(v, i, enter_row)
            elif self.rng.random() < self.s / self.x:
                out = self._res[int(self.rng.integers(len(self._res)))]
                self._remove(out, enter_row)
                self._insert(v, i, enter_row)
        # Vectorised collection for current members only: evicted
        # vertices' edges were discarded anyway (paper line 12).
        if not self._res:
            return
        r_arr = np.fromiter(self._res, dtype=np.int64, count=len(self._res))
        rows = np.flatnonzero(np.isin(a, r_arr))
        if len(rows) == 0:
            return
        sub = pd.DataFrame({"row": rows, "a": a[rows], "b": b[rows]})
        for v, grp in sub.groupby("a", sort=False):
            v = int(v)
            have = self.collected[v]
            need = self.d2 - len(have)
            if need <= 0:
                continue
            lo = enter_row.get(v, -1)
            take = grp[grp["row"] >= lo].head(need)
            have.extend(int(x) for x in take["b"].tolist())
        self.peak_collected = max(
            self.peak_collected, sum(len(v) for v in self.collected.values())
        )

    def _insert(self, v: int, row: int, enter_row: dict[int, int]) -> None:
        self._res_pos[v] = len(self._res)
        self._res.append(v)
        self.collected[v] = []
        enter_row[v] = row

    def _remove(self, v: int, enter_row: dict[int, int]) -> None:
        pos = self._res_pos.pop(v)
        last = self._res.pop()
        if last != v:
            self._res[pos] = last
            self._res_pos[last] = pos
        del self.collected[v]
        enter_row.pop(v, None)

    # ------------------------------------------------------------------ #

    @property
    def reservoir(self) -> list[int]:
        return list(self._res)

    def neighborhoods(self) -> dict[int, list[int]]:
        """All collected (possibly partial) neighborhoods."""
        return {v: list(bs) for v, bs in self.collected.items()}

    def succeeded(self) -> bool:
        """Paper's success: some stored neighborhood reached size ``d2``."""
        return any(len(bs) >= self.d2 for bs in self.collected.values())

    def result(self) -> Optional[tuple[int, set[int]]]:
        """Uniform random neighborhood among those of size ``d2``; None=fail."""
        full = [(v, bs) for v, bs in self.collected.items() if len(bs) >= self.d2]
        if not full:
            return None
        v, bs = full[int(self.rng.integers(len(full)))]
        return v, set(bs)

    def space_words(self) -> int:
        own = self.n if self._own_deg else 0
        return own + len(self._res) + sum(len(v) for v in self.collected.values()) + 2
