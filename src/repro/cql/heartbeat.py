"""STREAM-style heartbeat buffering (paper §3.2).

The STREAM system "accommodates out-of-order data by buffering it on
intake and presenting it to the query processor in timestamp order" — the
CQL language itself never sees out-of-order input. This module reproduces
that intake stage over an :class:`~repro.core.timeline.EventLog`: rows are
buffered until a heartbeat (we reuse the log's watermark advances as
heartbeats) passes their event timestamp, then released in event-time
order.

Returns three frames: the in-order released stream (with the processing
time of release), heartbeat violations (rows arriving at or below an
already-passed heartbeat — STREAM assumes these cannot happen; we surface
them instead of silently mis-ordering), and rows still pending at end of
input.
"""
from __future__ import annotations

from typing import Optional, Tuple

import pandas as pd

from ..core.timeline import EventLog, Insert, WatermarkAdvance


def reorder_with_heartbeat(
    log: EventLog, until=None
) -> Tuple[pd.DataFrame, pd.DataFrame, pd.DataFrame]:
    """Replay ``log`` through a heartbeat buffer.

    Returns ``(released, violations, pending)``; ``released`` has the
    payload columns plus ``release_ptime`` and is sorted by event time
    (ties: arrival order) — the order in which STREAM's query processor
    would consume the rows.
    """
    if log.etime_col is None:
        raise ValueError("heartbeat reordering needs an event-time column")
    until = None if until is None else pd.Timestamp(until)
    eidx = log.columns.index(log.etime_col)

    buffered: list = []  # (etime, seq, row)
    released_rows: list = []
    violations: list = []
    wm: Optional[pd.Timestamp] = None
    last_released: Optional[pd.Timestamp] = None
    seq = 0
    for e in log.events:
        if until is not None and e.ptime > until:
            break
        if isinstance(e, Insert):
            etime = pd.Timestamp(e.row[eidx])
            # A row is a violation only when it can no longer be released
            # in event-time order — i.e. a row with a later event time has
            # already left the buffer. (The paper's own example advances
            # the watermark to 8:05 and later receives a bid *at* 8:05;
            # that row is still orderable, and the paper treats it as
            # on-time.)
            if last_released is not None and etime < last_released:
                violations.append(e.row)
                continue
            buffered.append((etime, seq, e.row))
            seq += 1
        elif isinstance(e, WatermarkAdvance):
            wm = e.etime if wm is None else max(wm, e.etime)
            ready = sorted(x for x in buffered if x[0] <= wm)
            buffered = [x for x in buffered if x[0] > wm]
            for etime, _, row in ready:
                released_rows.append((*row, e.ptime))
                last_released = etime
    released = pd.DataFrame(
        released_rows, columns=log.columns + ["release_ptime"]
    )
    return (
        released,
        pd.DataFrame(violations, columns=log.columns),
        pd.DataFrame([x[2] for x in sorted(buffered)], columns=log.columns),
    )
