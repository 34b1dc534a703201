"""Shared helpers for the per-table benchmark suite.

Each ``bench_table*.py`` runs its table function exactly once through
``pytest-benchmark`` (``pedantic``, one round — the tables are themselves
timing experiments) at SF~0.1-equivalent scale, prints the rows, and
saves them to ``results/<name>.json`` for EXPERIMENTS.md.
"""
from __future__ import annotations

import json
import pathlib

RESULTS_DIR = pathlib.Path(__file__).resolve().parent.parent / "results"


def run_table(benchmark, fn, name: str, **kwargs) -> list[dict]:
    rows = benchmark.pedantic(lambda: fn(**kwargs), rounds=1, iterations=1)
    RESULTS_DIR.mkdir(exist_ok=True)
    (RESULTS_DIR / f"{name}.json").write_text(json.dumps(rows, indent=1, default=str))
    from repro.eval.harness import format_table

    cols: list[str] = []
    for r in rows:
        for c in r:
            if c not in cols:
                cols.append(c)
    print(f"\n== {name} ==")
    print(format_table(rows, cols))
    return rows
