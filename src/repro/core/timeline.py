"""Time-varying relations encoded as event logs (§3.1, §6.2).

An :class:`EventLog` is the changelog encoding of an input TVR: an ordered
sequence of ``INSERT`` events (each carrying a processing time and a payload
row) interleaved with watermark advances. The snapshot encoding — the classic
relation at any processing time ``p`` — is recovered with
:meth:`EventLog.snapshot_pdf` / :meth:`EventLog.snapshot_df`; the two
encodings are duals (Sax et al., cited as [33] in the paper).

Processing time is explicit data here, not a wall clock: the paper's worked
example scripts both the arrival times and the watermark timeline, and
reproducing its listings bit-for-bit requires replaying exactly that script.
"""
from __future__ import annotations

from dataclasses import dataclass
from typing import Iterable, Optional, Sequence, Union

import pandas as pd
from pyspark.sql import DataFrame, SparkSession

from .watermark import Watermark


@dataclass(frozen=True)
class Insert:
    """An INSERT of one payload row at processing time ``ptime``."""

    ptime: pd.Timestamp
    row: tuple


@dataclass(frozen=True)
class WatermarkAdvance:
    """The input watermark advancing to event time ``etime`` at ``ptime``."""

    ptime: pd.Timestamp
    etime: pd.Timestamp


Event = Union[Insert, WatermarkAdvance]


class EventLog:
    """Changelog + watermark-timeline encoding of one input TVR.

    Parameters
    ----------
    columns:
        Payload column names.
    etime_col:
        Name of the distinguished event-time column (Extension 1). May be
        ``None`` for relations with no event-time attribute (classic tables).
    """

    def __init__(self, columns: Sequence[str], etime_col: Optional[str] = None):
        self.columns = list(columns)
        if etime_col is not None and etime_col not in self.columns:
            raise ValueError(f"etime_col {etime_col!r} not in columns {columns}")
        self.etime_col = etime_col
        self.events: list[Event] = []
        self._max_ptime: Optional[pd.Timestamp] = None

    # -- construction -----------------------------------------------------

    def _check_ptime(self, ptime: pd.Timestamp) -> pd.Timestamp:
        ptime = pd.Timestamp(ptime)
        if self._max_ptime is not None and ptime < self._max_ptime:
            raise ValueError(
                f"events must be appended in ptime order: {ptime} < {self._max_ptime}"
            )
        self._max_ptime = ptime
        return ptime

    def insert(self, ptime, *values, **kw) -> "EventLog":
        """Append an INSERT. Row given positionally (column order) or by
        keyword; returns ``self`` for chaining."""
        if values and kw:
            raise ValueError("pass the row positionally or by keyword, not both")
        if kw:
            missing = set(self.columns) - set(kw)
            if missing:
                raise ValueError(f"missing columns: {sorted(missing)}")
            values = tuple(kw[c] for c in self.columns)
        if len(values) != len(self.columns):
            raise ValueError(
                f"row has {len(values)} values, expected {len(self.columns)}"
            )
        self.events.append(Insert(self._check_ptime(ptime), tuple(values)))
        return self

    def watermark_to(self, ptime, etime) -> "EventLog":
        """Append a watermark advance; returns ``self`` for chaining."""
        if self.etime_col is None:
            raise ValueError("cannot advance a watermark on a log without etime_col")
        self.events.append(
            WatermarkAdvance(self._check_ptime(ptime), pd.Timestamp(etime))
        )
        return self

    @staticmethod
    def from_pandas(
        pdf: pd.DataFrame,
        *,
        ptime_col: str,
        etime_col: Optional[str] = None,
        watermarks: Iterable = (),
    ) -> "EventLog":
        """Build a log from a pandas frame with an arrival-time column.

        ``watermarks`` is an iterable of ``(ptime, etime)`` advances; they
        are merged into the event sequence in ptime order (watermarks after
        inserts at the same ptime, so a batch is fully applied before its
        closing watermark is observed).
        """
        cols = [c for c in pdf.columns if c != ptime_col]
        log = EventLog(cols, etime_col=etime_col)
        inserts = [
            (pd.Timestamp(rec[0]), 0, tuple(rec[1:]))
            for rec in pdf[[ptime_col] + cols].itertuples(index=False, name=None)
        ]
        wms = [(pd.Timestamp(p), 1, pd.Timestamp(e)) for p, e in watermarks]
        for ptime, kind, payload in sorted(inserts + wms, key=lambda x: (x[0], x[1])):
            if kind == 0:
                log.insert(ptime, *payload)
            else:
                log.watermark_to(ptime, payload)
        return log

    # -- inspection -------------------------------------------------------

    def ptimes(self) -> list:
        """Sorted distinct processing times of all events."""
        return sorted({e.ptime for e in self.events})

    def end_ptime(self) -> Optional[pd.Timestamp]:
        return self._max_ptime

    def watermark(self) -> Watermark:
        """The input watermark timeline as a :class:`Watermark`."""
        return Watermark.from_updates(
            (e.ptime, e.etime) for e in self.events if isinstance(e, WatermarkAdvance)
        )

    def validate_watermark(self) -> list:
        """Return the inserts that *violate* the watermark: rows whose event
        timestamp is strictly below the watermark in force at their arrival.
        A row with etime exactly equal to the watermark is valid — with
        half-open windows ``[ws, we)`` it can never land in a grouping the
        watermark has already completed (the paper's own example contains
        such a row: bid C at 8:05 after WM -> 8:05). Empty for a
        well-formed log; a heuristic watermark may legitimately be violated
        and the engine then treats those rows as late data."""
        if self.etime_col is None:
            return []
        idx = self.columns.index(self.etime_col)
        wm: Optional[pd.Timestamp] = None
        bad = []
        for e in self.events:
            if isinstance(e, WatermarkAdvance):
                wm = e.etime if wm is None else max(wm, e.etime)
            elif wm is not None and pd.Timestamp(e.row[idx]) < wm:
                bad.append(e)
        return bad

    # -- snapshot (table) encoding ---------------------------------------

    def snapshot_pdf(self, at=None) -> pd.DataFrame:
        """The classic relation at processing time ``at`` (inclusive) as a
        pandas frame; all rows if ``at`` is None."""
        at = None if at is None else pd.Timestamp(at)
        rows = [
            e.row
            for e in self.events
            if isinstance(e, Insert) and (at is None or e.ptime <= at)
        ]
        return pd.DataFrame(rows, columns=self.columns)

    def snapshot_df(self, spark: SparkSession, at=None, schema=None) -> DataFrame:
        """The snapshot as a Spark DataFrame. Pass ``schema`` (from a prior
        non-empty snapshot) to keep types stable when the snapshot is empty."""
        pdf = self.snapshot_pdf(at)
        if schema is not None:
            return spark.createDataFrame(pdf, schema=schema)
        return spark.createDataFrame(pdf)

    def arrivals_pdf(self, at=None) -> pd.DataFrame:
        """Snapshot plus a ``ptime`` arrival column (for engines/benchmarks
        that batch by arrival time)."""
        at = None if at is None else pd.Timestamp(at)
        rows = [
            (e.ptime, *e.row)
            for e in self.events
            if isinstance(e, Insert) and (at is None or e.ptime <= at)
        ]
        return pd.DataFrame(rows, columns=["ptime"] + self.columns)

    # -- combination ------------------------------------------------------

    def merge(self, other: "EventLog") -> "EventLog":
        """Union two same-schema logs into one, interleaving by ptime and
        combining watermarks with the pointwise minimum (hold-back)."""
        if self.columns != other.columns or self.etime_col != other.etime_col:
            raise ValueError("merge requires identical schemas")
        merged = EventLog(self.columns, etime_col=self.etime_col)
        combined_wm = Watermark.combine_min(self.watermark(), other.watermark())
        ev: list[tuple] = []
        for src in (self.events, other.events):
            for i, e in enumerate(src):
                if isinstance(e, Insert):
                    ev.append((e.ptime, 0, i, e))
        for p, et in combined_wm.updates:
            ev.append((p, 1, 0, WatermarkAdvance(p, et)))
        for _, _, _, e in sorted(ev, key=lambda x: (x[0], x[1], x[2])):
            if isinstance(e, Insert):
                merged.insert(e.ptime, *e.row)
            else:
                merged.watermark_to(e.ptime, e.etime)
        return merged

    def __len__(self) -> int:
        return len(self.events)

    def n_inserts(self) -> int:
        return sum(1 for e in self.events if isinstance(e, Insert))
