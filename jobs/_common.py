"""Shared runner for the per-table spark-submit entrypoints.

Each job module defines ``TABLE`` (a callable from
:mod:`repro.eval.tables`) plus optional ``KWARGS``; :func:`main` builds
the session, runs it, and prints the rows as a monospace table.
"""
from __future__ import annotations

import json
import sys

from pyspark.sql import SparkSession


def get_spark(app: str) -> SparkSession:
    return (
        SparkSession.builder.appName(app)
        .config("spark.sql.execution.arrow.pyspark.enabled", "true")
        .config("spark.sql.autoBroadcastJoinThreshold", -1)
        .getOrCreate()
    )


def main(table_fn, title: str, **kwargs) -> list[dict]:
    from repro.eval.harness import format_table

    spark = get_spark(title)
    spark.sparkContext.setLogLevel("ERROR")
    rows = table_fn(spark, **kwargs)
    cols: list[str] = []
    for r in rows:
        for c in r:
            if c not in cols:
                cols.append(c)
    print(f"\n== {title} ==")
    print(format_table(rows, cols))
    print(json.dumps(rows, default=str), file=sys.stderr)
    spark.stop()
    return rows
