"""Benchmark: Fig. 10 — graph variants + multi-vector opt.

Runs the table reproduction once at SF~0.1 scale; rows are printed and
saved to ``results/bench_ablation_graphs.json`` (recorded in EXPERIMENTS.md).
"""
from _bench_util import run_table
from repro.eval.harness import EvalConfig
from repro.eval.tables import ablation_graphs

CFG = EvalConfig(ks=(1, 5, 10), l=128, l_cand=100, gamma=16, eps=3, epochs=10)
COCO_CFG = EvalConfig(ks=(10, 50, 100), l=256, l_cand=200, gamma=16, eps=3, epochs=10)


def test_bench_ablation_graphs(benchmark, spark):
    rows = run_table(benchmark, ablation_graphs, "bench_ablation_graphs", **dict(spark=spark, n=10_000, nq=240, gamma=20))
    assert rows
