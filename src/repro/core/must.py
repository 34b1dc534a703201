"""End-to-end MUST framework facade (paper §IV, Fig. 4).

Ties the pieces together: vector weight learning (§VI) on a training
split of the anchors, fused-index construction (§VII-A) under the
learned (or user-supplied, Tab. IX) weights, and the merging-free joint
search (§VII-B). ``brute=True`` gives the paper's ``MUST--`` variant
(distributed exact scan instead of the index).
"""
from __future__ import annotations

import time
from dataclasses import dataclass
from typing import Sequence

import numpy as np
from pyspark.sql import SparkSession

from repro.ann.bruteforce import topk_scan
from repro.core.fused_index import FusedIndex, build_fused_index
from repro.core.joint_search import SearchOutput, joint_search
from repro.core.weights import WeightLearnResult, learn_weights


@dataclass
class Must:
    """A ready-to-search MUST deployment."""

    spark: SparkSession
    obj_mats: list[np.ndarray]
    weights: np.ndarray
    index: FusedIndex | None  # None => brute-force-only (MUST--)
    weight_result: WeightLearnResult | None = None

    def search(
        self,
        qry_mats: Sequence[np.ndarray | None],
        k: int,
        l: int | None = None,
        *,
        optimize: bool = True,
        seed: int = 0,
    ) -> SearchOutput:
        """Joint search; falls back to the exact distributed scan when no
        index was built (``MUST--``)."""
        if self.index is not None:
            return joint_search(
                self.spark, qry_mats, self.obj_mats, self.index, k,
                l or max(4 * k, 100), optimize=optimize, seed=seed,
            )
        weights = [
            float(w) if qry_mats[i] is not None else 0.0
            for i, w in enumerate(self.weights)
        ]
        active = [a for a in qry_mats if a is not None]
        nq = active[0].shape[0]
        t0 = time.perf_counter()
        pdf = (
            topk_scan(
                self.spark,
                [a if a is not None else np.zeros((nq, m.shape[1]), np.float32)
                 for a, m in zip(qry_mats, self.obj_mats)],
                self.obj_mats, weights, k,
            )
            .toPandas()
            .sort_values(["qid", "rank"])
        )
        elapsed = time.perf_counter() - t0
        ids = np.full((nq, k), -1, dtype=np.int64)
        ips = np.full((nq, k), -np.inf)
        for qid, grp in pdf.groupby("qid"):
            ids[qid, : len(grp)] = grp["oid"].to_numpy()[:k]
            ips[qid, : len(grp)] = grp["ip_joint"].to_numpy()[:k]
        return SearchOutput(ids=ids, ips=ips, elapsed_s=elapsed, stats={})


def fit_must(
    spark: SparkSession,
    obj_mats: Sequence[np.ndarray],
    *,
    weights: Sequence[float] | None = None,
    train_qry_mats: Sequence[np.ndarray] | None = None,
    train_positives: np.ndarray | None = None,
    brute: bool = False,
    gamma: int = 30,
    eps: int = 3,
    variant: str = "ours",
    epochs: int = 30,
    seed: int = 0,
) -> Must:
    """Build a MUST deployment.

    Weight precedence: explicit ``weights`` (user-defined, Tab. IX) >
    learned from ``train_qry_mats``/``train_positives`` (§VI) > uniform.
    """
    obj_mats = [np.ascontiguousarray(a, np.float32) for a in obj_mats]
    m = len(obj_mats)
    wres = None
    if weights is not None:
        w = np.asarray(weights, dtype=np.float64)
    elif train_qry_mats is not None and train_positives is not None:
        wres = learn_weights(
            spark, train_qry_mats, obj_mats, train_positives,
            epochs=epochs, seed=seed,
        )
        w = wres.weights
    else:
        w = np.full(m, 1.0 / m)
    index = None
    if not brute:
        index = build_fused_index(
            spark, obj_mats, w, gamma=gamma, eps=eps, variant=variant, seed=seed
        )
    return Must(
        spark=spark, obj_mats=list(obj_mats), weights=w,
        index=index, weight_result=wres,
    )
