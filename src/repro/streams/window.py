"""Count-based sliding window over incomplete data streams (Defs. 1-2).

The paper's model advances one tuple per timestamp per stream; evaluating a
per-tuple loop through Spark would measure nothing but scheduler overhead, so
(per the micro-batch substitution in DESIGN.md §2) the driver advances the
window in *micro-batches* of ``batch_size`` arrivals: at each step the oldest
``batch_size`` tuples per stream expire and ``batch_size`` new ones arrive.
Reported per-timestamp wall-clock = batch wall-clock / arrivals, matching the
paper's "average wall clock time ... for each new timestamp".
"""
from __future__ import annotations

from dataclasses import dataclass
from typing import Iterator

import pandas as pd


@dataclass
class WindowBatch:
    """One micro-batch step: newly arrived tuples, expired rids, and the
    window contents *before* this batch's arrivals (the paper's W_{t-1},
    against which new tuples are matched)."""

    step: int
    arrived: pd.DataFrame
    expired_rids: list[int]
    window_before: pd.DataFrame
    n_arrivals: int


def sliding_batches(
    stream: pd.DataFrame, *, w: int, batch_size: int, max_batches: int | None = None,
    warmup: bool = True,
) -> Iterator[WindowBatch]:
    """Iterate micro-batches of the count-based sliding window.

    ``stream`` must be sorted by ``ts``. Each stream keeps its own window of
    the ``w`` most recent tuples (Def. 2, per-stream windows). When
    ``warmup`` is set, the first window-fill of ``w`` tuples per stream is
    emitted as one batch (step 0) so steady-state steps are measured on a
    full window — matching the paper, which reports per-timestamp cost of a
    full window.
    """
    stream = stream.sort_values(["ts", "rid"], kind="stable").reset_index(drop=True)
    per_stream: dict[int, list[int]] = {}   # stream_id -> rids in window (FIFO)
    pos = 0
    step = 0
    n = len(stream)
    sids = sorted(stream["stream_id"].unique())

    def take(k: int) -> pd.DataFrame:
        nonlocal pos
        chunk = stream.iloc[pos : pos + k]
        pos += len(chunk)
        return chunk

    if warmup:
        # Fill until every stream has w tuples (or the input runs out).
        need = {s: w for s in sids}
        rows = []
        while pos < n and any(v > 0 for v in need.values()):
            row = stream.iloc[pos]
            pos += 1
            rows.append(row)
            if need.get(row["stream_id"], 0) > 0:
                need[row["stream_id"]] -= 1
        arrived = pd.DataFrame(rows).reset_index(drop=True) if rows else stream.iloc[0:0]
        window_before = stream.iloc[0:0]
        yield _advance(per_stream, arrived, window_before, stream, w, step)
        step += 1

    while pos < n:
        if max_batches is not None and step > (max_batches if warmup else max_batches - 1):
            return
        arrived = take(batch_size * len(sids))
        if arrived.empty:
            return
        in_window = [r for rids in per_stream.values() for r in rids]
        window_before = stream[stream["rid"].isin(in_window)]
        yield _advance(per_stream, arrived, window_before, stream, w, step)
        step += 1


def _advance(per_stream, arrived, window_before, stream, w, step) -> WindowBatch:
    expired: list[int] = []
    for _, row in arrived.iterrows():
        sid = row["stream_id"]
        rids = per_stream.setdefault(sid, [])
        rids.append(int(row["rid"]))
        if len(rids) > w:
            expired.append(rids.pop(0))
    return WindowBatch(
        step=step,
        arrived=arrived.reset_index(drop=True),
        expired_rids=expired,
        window_before=window_before.reset_index(drop=True),
        n_arrivals=len(arrived),
    )
