"""Experiment harness: run (dataset x framework x encoder-combo) and emit
the rows of the paper's evaluation tables (see DESIGN.md §4).

Protocol shared by all accuracy tables:

* queries are split in half — the first half trains the vector-weight
  model (MUST only), the second half is evaluated for every framework
  (so MUST never scores the anchors it trained on);
* Recall@k(1) and SME are means over the evaluation split;
* all frameworks share the same encoders and the same graph machinery
  (paper §VIII-A "fair comparison" setup).
"""
from __future__ import annotations

from dataclasses import dataclass

import numpy as np
from pyspark.sql import SparkSession

from repro.baselines.je import fit_je
from repro.baselines.mr import fit_mr
from repro.core.must import fit_must
from repro.datasets import MSTMDataset
from repro.eval.metrics import recall_at_k, sme

FRAMEWORKS = ("must", "must--", "mr", "mr--", "je", "je--")


@dataclass
class EvalConfig:
    """Shared evaluation knobs (defaults sized for SF-test scale)."""

    ks: tuple[int, ...] = (1, 5, 10)
    l: int = 128            # result-set size of Algorithm 2
    l_cand: int = 100       # per-modality candidates for MR's merge
    gamma: int = 16
    eps: int = 3
    epochs: int = 20
    seed: int = 0


def split_queries(ds: MSTMDataset, train_frac: float = 0.5):
    """Deterministic train/eval split of the query ids."""
    n_train = int(ds.nq * train_frac)
    return np.arange(n_train), np.arange(n_train, ds.nq)


def evaluate(
    spark: SparkSession,
    ds: MSTMDataset,
    framework: str,
    cfg: EvalConfig | None = None,
    *,
    weights=None,
    active: list[int] | None = None,
) -> dict:
    """One table row: recall@k / SME / timings for a framework on ``ds``.

    ``weights`` forces user-defined weights (Tab. IX); ``active``
    restricts the query modalities (t < m, Tab. X/XIX/XX).
    """
    if framework not in FRAMEWORKS:
        raise ValueError(f"framework must be one of {FRAMEWORKS}")
    cfg = cfg or EvalConfig()
    train_idx, eval_idx = split_queries(ds)
    k = max(cfg.ks)
    eval_q = [m[eval_idx] for m in ds.qry_mats]
    if active is not None:
        eval_q = [q if i in active else None for i, q in enumerate(eval_q)]
    gt_eval = ds.gt[eval_idx]

    row = {
        "dataset": ds.name,
        "framework": framework,
        "encoder": "+".join(ds.encoders),
        "n": ds.n,
        "nq_eval": len(eval_idx),
    }

    if framework in ("must", "must--"):
        model = fit_must(
            spark, ds.obj_mats,
            weights=weights,
            train_qry_mats=None if weights is not None else [m[train_idx] for m in ds.qry_mats],
            train_positives=None if weights is not None else ds.gt[train_idx],
            brute=framework == "must--",
            gamma=cfg.gamma, eps=cfg.eps, epochs=cfg.epochs, seed=cfg.seed,
        )
        out = model.search(eval_q, k=k, l=cfg.l, seed=cfg.seed)
        row["weights"] = [round(float(w), 4) for w in model.weights]
        row["build_s"] = model.index.build_seconds if model.index else 0.0
    elif framework in ("mr", "mr--"):
        model = fit_mr(
            spark, ds.obj_mats, brute=framework == "mr--",
            gamma=cfg.gamma, eps=cfg.eps, seed=cfg.seed,
        )
        out = model.search(eval_q, k=k, l_cand=cfg.l_cand, seed=cfg.seed)
        row["build_s"] = model.build_seconds
    else:  # je / je--
        model = fit_je(
            spark, ds.obj_mats[0], brute=framework == "je--",
            gamma=cfg.gamma, eps=cfg.eps, seed=cfg.seed,
        )
        out = model.search([eval_q[0]], k=k, l=cfg.l, seed=cfg.seed)
        row["build_s"] = model.index.build_seconds if model.index else 0.0

    for kk in cfg.ks:
        row[f"recall@{kk}"] = round(recall_at_k(out.ids, gt_eval, kk), 4)
    row["sme"] = round(sme(out.ids, gt_eval, ds.obj_mats[0]), 4)
    row["search_s"] = round(out.elapsed_s, 3)
    row["qps"] = round(out.qps, 1)
    return row


def format_table(rows: list[dict], cols: list[str]) -> str:
    """Monospace table for EXPERIMENTS.md / job stdout."""
    header = " | ".join(f"{c:>12}" for c in cols)
    lines = [header, "-" * len(header)]
    for r in rows:
        lines.append(" | ".join(f"{str(r.get(c, '')):>12}" for c in cols))
    return "\n".join(lines)
