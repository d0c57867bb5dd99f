"""CQL stream-to-relation operators (paper §2.1.1).

``[RANGE r SLIDE s]`` turns a timestamped stream into a *relation
history*: for each evaluation instant ``tau`` on the slide grid, the
instantaneous relation R(tau) contains the tuples with timestamp in
``(tau - r, tau]``. We materialize the history as one DataFrame with a
``tau`` column — each input row exploded to every instant at which it is
visible — computed entirely with Catalyst expressions (same technique as
the Hop TVF).
"""
from __future__ import annotations

from datetime import timedelta
from typing import Union

from pyspark.sql import DataFrame
from pyspark.sql import functions as F

from ..core.windows import _seconds

Duration = Union[timedelta, int, float]

TAU = "tau"


def range_slide_history(
    stream: DataFrame,
    timecol: str,
    range_: Duration,
    slide: Duration,
) -> DataFrame:
    """The relation history of ``stream [RANGE range_ SLIDE slide]``.

    A tuple with timestamp ``t`` is in R(tau) iff ``tau - range_ < t <=
    tau``, i.e. for grid instants ``tau`` in ``[t, t + range_)``. The grid
    is the multiples of ``slide`` (epoch-aligned, like CQL's NEXMark
    queries assume).
    """
    r = _seconds(range_, "range")
    s = _seconds(slide, "slide")
    u = f"unix_seconds({timecol})"
    first = f"(-FLOOR(-({u}) / {s}) * {s})"  # ceil to grid
    last = f"(FLOOR(({u} + {r} - 1) / {s}) * {s})"  # largest grid < t + r
    taus = (
        f"CASE WHEN {first} <= {last} "
        f"THEN sequence({first}, {last}, {s}) ELSE array() END"
    )
    return (
        stream.select("*", F.explode(F.expr(taus)).alias("__tau"))
        .withColumn(TAU, F.expr("timestamp_seconds(__tau)"))
        .drop("__tau")
    )
