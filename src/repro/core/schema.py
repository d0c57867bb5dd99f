"""Event-time attribute / watermark-alignment tracking (Extension 1, §5).

The paper's Section 5 lessons observe that (a) event timestamps are ordinary
data, so arbitrary expressions over them may *erase* watermark alignment,
(b) a TVR may carry more than one event-time attribute (e.g. after a join),
in which case the watermark must be held back to the minimum, and (c) query
planning must track which columns remain aligned.

:class:`EventTimeSchema` is the planner-side metadata object doing exactly
that: a set of column names plus the subset that are *watermarked event-time
columns*. Relational operations transform it:

- ``project``: verbatim forwarding (or pure renaming) of an event-time
  column preserves alignment; any computed expression degrades the output
  column to a plain TIMESTAMP (the conservative Flink rule from §B.2.3).
- ``shift``: adding/subtracting a constant interval preserves alignment
  (the watermark can be adjusted by the same constant).
- ``window``: Tumble/Hop append aligned ``wstart``/``wend`` columns.
- ``join``: the union of both sides' event-time columns stays watermarked,
  with the combined watermark held back to the minimum of the inputs.
"""
from __future__ import annotations

from dataclasses import dataclass
from typing import Mapping, Optional


@dataclass(frozen=True)
class EventTimeSchema:
    """Columns of a TVR plus which of them are watermarked event-time."""

    columns: tuple
    event_time_cols: frozenset

    def __post_init__(self) -> None:
        unknown = self.event_time_cols - set(self.columns)
        if unknown:
            raise ValueError(f"event-time cols not in schema: {sorted(unknown)}")

    @staticmethod
    def of(columns, event_time_cols=()) -> "EventTimeSchema":
        return EventTimeSchema(tuple(columns), frozenset(event_time_cols))

    def is_aligned(self, col: str) -> bool:
        """True iff ``col`` is an event-time column still aligned with the
        relation's watermark."""
        return col in self.event_time_cols

    def project(self, outputs: Mapping[str, str]) -> "EventTimeSchema":
        """Apply a projection ``out_name -> source``.

        ``source`` is either an existing column name (verbatim forwarding /
        renaming: alignment preserved if the source is aligned) or any other
        expression string (alignment erased — the conservative rule).
        """
        cols = tuple(outputs.keys())
        et = frozenset(
            out
            for out, src in outputs.items()
            if src in self.columns and src in self.event_time_cols
        )
        return EventTimeSchema(cols, et)

    def shift(self, col: str, new_name: Optional[str] = None) -> "EventTimeSchema":
        """Model ``new_name = col +/- constant interval``: a constant shift
        of an aligned column stays aligned (watermark shifted equally)."""
        if col not in self.columns:
            raise ValueError(f"unknown column {col!r}")
        new_name = new_name or col
        cols = self.columns if new_name in self.columns else self.columns + (new_name,)
        if col in self.event_time_cols:
            return EventTimeSchema(cols, self.event_time_cols | {new_name})
        return EventTimeSchema(cols, self.event_time_cols)

    def window(self, timecol: str) -> "EventTimeSchema":
        """Apply a windowing TVF on ``timecol``: appends aligned ``wstart``
        and ``wend`` columns. Requires ``timecol`` to be aligned — windowing
        an unaligned timestamp cannot reason about completeness (§5)."""
        if not self.is_aligned(timecol):
            raise ValueError(
                f"{timecol!r} is not a watermarked event-time column; "
                "windowing requires watermark alignment"
            )
        cols = self.columns + ("wstart", "wend")
        return EventTimeSchema(cols, self.event_time_cols | {"wstart", "wend"})

    def join(self, other: "EventTimeSchema") -> "EventTimeSchema":
        """Join two TVRs: disjoint column names required; both sides' event
        time columns remain watermarked via min-combined (held-back)
        watermarks."""
        overlap = set(self.columns) & set(other.columns)
        if overlap:
            raise ValueError(f"join requires disjoint column names: {sorted(overlap)}")
        return EventTimeSchema(
            self.columns + other.columns,
            self.event_time_cols | other.event_time_cols,
        )

    def degrade(self, col: str) -> "EventTimeSchema":
        """Explicitly erase alignment of ``col`` (e.g. after an operator
        that emits rows out of watermark order)."""
        return EventTimeSchema(self.columns, self.event_time_cols - {col})
