"""Parsing for the proposed SQL extensions (paper §6).

Two independent pieces of syntax are handled:

- the ``EMIT`` clause (Extensions 4–7): ``EMIT [STREAM] [AFTER DELAY
  <interval>] [AND] [AFTER WATERMARK]`` at the top level of a query;
- SQL interval literals ``INTERVAL '<n>' <unit>[S]`` used both in EMIT and
  in TVF arguments.

The windowing-TVF invocation syntax is handled in ``rewrite.py`` (it needs
balanced-parenthesis extraction, not tokens).
"""
from __future__ import annotations

import re
from datetime import timedelta
from typing import Tuple

from ..core.emit import EmitSpec

_INTERVAL_RE = re.compile(
    r"INTERVAL\s+'(?P<n>\d+)'\s+(?P<unit>SECOND|MINUTE|HOUR|DAY)S?",
    re.IGNORECASE,
)

_UNIT_SECONDS = {"SECOND": 1, "MINUTE": 60, "HOUR": 3600, "DAY": 86400}


def parse_interval(text: str) -> timedelta:
    """Parse a SQL interval literal like ``INTERVAL '10' MINUTE``."""
    m = _INTERVAL_RE.fullmatch(text.strip())
    if not m:
        raise ValueError(f"not a supported interval literal: {text!r}")
    return timedelta(seconds=int(m.group("n")) * _UNIT_SECONDS[m.group("unit").upper()])


_EMIT_RE = re.compile(r"\bEMIT\b", re.IGNORECASE)


def split_emit(sql: str) -> Tuple[str, EmitSpec]:
    """Split a query into (core SQL, EmitSpec).

    The EMIT clause is only allowed at the top level, at the end of the
    query (the paper proposes exactly this placement; see "Nested EMIT" in
    its Future Work). A query without EMIT gets the default instantaneous
    table semantics.
    """
    sql_nosemi = sql.strip().rstrip(";").strip()
    m = _EMIT_RE.search(sql_nosemi)
    if not m:
        return sql_nosemi, EmitSpec()
    if _EMIT_RE.search(sql_nosemi, m.end()):
        raise ValueError("multiple EMIT clauses found; EMIT is top-level-only")
    core = sql_nosemi[: m.start()].strip()
    clause = sql_nosemi[m.start() :].strip()
    if ")" in clause:
        raise ValueError("EMIT must be the final top-level clause of the query")
    return core, parse_emit_clause(clause)


def parse_emit_clause(clause: str) -> EmitSpec:
    """Parse ``EMIT [STREAM] [gates]`` where gates are ``AFTER WATERMARK``
    and/or ``AFTER DELAY <interval>`` joined by ``AND``."""
    text = clause.strip().rstrip(";").strip()
    m = re.match(r"EMIT\b\s*", text, re.IGNORECASE)
    if not m:
        raise ValueError(f"not an EMIT clause: {clause!r}")
    rest = text[m.end() :].strip()
    stream = False
    sm = re.match(r"STREAM\b\s*", rest, re.IGNORECASE)
    if sm:
        stream = True
        rest = rest[sm.end() :].strip()
    after_watermark = False
    after_delay = None
    if rest:
        gates = re.split(r"\bAND\b", rest, flags=re.IGNORECASE)
        for gate in gates:
            gate = gate.strip()
            if re.fullmatch(r"AFTER\s+WATERMARK", gate, re.IGNORECASE):
                if after_watermark:
                    raise ValueError("duplicate AFTER WATERMARK")
                after_watermark = True
                continue
            dm = re.fullmatch(r"AFTER\s+DELAY\s+(.+)", gate, re.IGNORECASE | re.DOTALL)
            if dm:
                if after_delay is not None:
                    raise ValueError("duplicate AFTER DELAY")
                after_delay = parse_interval(dm.group(1))
                continue
            raise ValueError(f"unrecognized EMIT gate: {gate!r}")
    return EmitSpec(
        stream=stream, after_watermark=after_watermark, after_delay=after_delay
    )
