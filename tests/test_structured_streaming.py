"""Structured Streaming stateful witness-counter operator (repro hint)."""
import os

import numpy as np
import pandas as pd
import pytest

from repro.streamsim import structured as st

_QUERY_N = [0]


@pytest.fixture()
def events():
    g = np.random.default_rng(7)
    n = 1200
    return pd.DataFrame(
        {
            "ts": np.arange(n, dtype=np.int64),
            "item": g.choice([1, 2, 3, 4, 5], size=n, p=[0.5, 0.2, 0.1, 0.1, 0.1]),
            "witness": np.arange(n, dtype=np.int64),
        }
    )


def _run(spark, events, tmp_path, w, n_files):
    _QUERY_N[0] += 1
    name = f"wtest_{_QUERY_N[0]}"
    ind = os.path.join(str(tmp_path), "in")
    cp = os.path.join(str(tmp_path), "cp")
    st.write_event_files(events, ind, n_files=n_files)
    updates = st.run_witness_query(spark, ind, cp, name, w=w)
    return st.final_state(updates), updates


def test_counts_match_batch_oracle(spark, events, tmp_path):
    fs, _ = _run(spark, events, tmp_path, w=8, n_files=6)
    truth = events.groupby("item").size()
    got = fs.set_index("item")["count"]
    for item, cnt in truth.items():
        assert int(got.loc[item]) == int(cnt)


def test_witnesses_are_earliest_and_bounded(spark, events, tmp_path):
    w = 8
    fs, _ = _run(spark, events, tmp_path, w=w, n_files=6)
    for row in fs.itertuples():
        expected = (
            events[events["item"] == row.item]
            .sort_values("ts")["witness"]
            .head(w)
            .tolist()
        )
        assert list(row.witnesses) == expected


def test_state_persists_across_microbatches(spark, events, tmp_path):
    """With one file per micro-batch, per-item updates accumulate."""
    _, updates = _run(spark, events, tmp_path, w=4, n_files=5)
    pdf = updates.toPandas()
    # the dominant item appears in every micro-batch, so its count must
    # have been emitted with several strictly increasing values
    item1 = sorted(pdf.loc[pdf["item"] == 1, "count"].tolist())
    assert len(item1) >= 3
    assert item1 == sorted(set(item1))


def test_single_batch_equivalent(spark, events, tmp_path):
    fs, _ = _run(spark, events, tmp_path, w=8, n_files=1)
    truth = events.groupby("item").size()
    got = dict(zip(fs["item"].astype(int), fs["count"].astype(int)))
    assert got == {int(k): int(v) for k, v in truth.items()}
