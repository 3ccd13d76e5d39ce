"""One-way multi-party protocol simulator (paper §2.1, §4, §6).

The paper's reductions all have the same operational shape: party 1
runs the streaming algorithm on its edges and "sends the resulting
memory state" to party 2, and so on. We simulate exactly that: each
party advances a ``StreamProcessor`` on its own substream, and the
message is the serialized processor state. ``max_message_bytes`` is the
protocol's communication cost ``max_i |M_i|`` — the quantity the
lower-bound theorems bound from below.
"""
from __future__ import annotations

from typing import Callable, Sequence

import pandas as pd

from repro.streamsim.runner import (
    StreamProcessor,
    checkpoint,
    restore,
    run_stream_pandas,
)


def simulate_one_way(
    make_proc: Callable[[], StreamProcessor],
    party_streams: Sequence[pd.DataFrame],
    batch_size: int = 65536,
) -> tuple[StreamProcessor, int]:
    """Run the one-way protocol; return (final processor, max |M_i| bytes).

    Serialization/deserialization between parties is real (pickle), so
    the measured message length includes everything the algorithm's
    state actually contains — no accounting shortcuts.
    """
    proc = make_proc()
    max_msg = 0
    for i, pdf in enumerate(party_streams):
        run_stream_pandas(proc, pdf, batch_size)
        if i < len(party_streams) - 1:
            blob = checkpoint(proc)
            max_msg = max(max_msg, len(blob))
            proc = restore(blob)
    return proc, max_msg
