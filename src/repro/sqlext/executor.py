"""Executing extended-SQL text over event logs with the TVR engine.

``run_extended_sql`` is the end-to-end path the paper proposes: take a
query in the extended dialect (TVF syntax + EMIT clause), split off the
materialization spec, rewrite the relational core to plain Spark SQL, and
evaluate it continuously over the inputs' scripted timelines.
"""
from __future__ import annotations

from typing import Mapping, Optional, Sequence, Union

from pyspark.sql import DataFrame, SparkSession

from ..core.emit import EmitSpec
from ..core.engine import StreamResult, TvrEngine
from ..core.timeline import EventLog
from .parser import split_emit
from .rewrite import rewrite_extended_sql


def sql_query_fn(core_sql: str):
    """Wrap already-rewritten Spark SQL as the engine's query callable:
    each micro-batch registers the inputs' snapshots as temp views and runs
    the statement through Catalyst."""

    def query(spark: SparkSession, **dfs: DataFrame) -> DataFrame:
        for name, df in dfs.items():
            df.createOrReplaceTempView(name)
        return spark.sql(core_sql)

    return query


def run_extended_sql(
    spark: SparkSession,
    sql: str,
    logs: Union[EventLog, Mapping[str, EventLog]],
    *,
    key_cols: Optional[Sequence[str]] = None,
    wend_col: Optional[str] = None,
    until=None,
    emit_override: Optional[EmitSpec] = None,
) -> StreamResult:
    """Run an extended-dialect query over the given event logs.

    The EMIT clause in the text decides materialization unless
    ``emit_override`` is given (used by jobs that print several views of
    one query). ``key_cols``/``wend_col`` declare the result's event-time
    grouping, defaulting to (wstart, wend)/wend when the query uses a
    windowing TVF.
    """
    core, emit = split_emit(sql)
    rewritten, calls = rewrite_extended_sql(core)
    if calls and key_cols is None:
        key_cols = ["wstart", "wend"]
    if calls and wend_col is None:
        wend_col = "wend"
    engine = TvrEngine(
        spark, sql_query_fn(rewritten), key_cols=key_cols, wend_col=wend_col
    )
    return engine.run(logs, emit=emit_override or emit, until=until)
