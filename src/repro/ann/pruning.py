"""Candidate acquisition + neighbor selection (paper Algorithm 1, ②③).

One distributed pass over vertices: each worker receives the broadcast
kNN graph from ①, forms the candidate set ``C(o) = N(o) ∪ N(N(o))``
(component ②) and applies a pluggable selection strategy (component ③):

* ``mrng``  — the paper's choice (MRNG [25], Lemma 2): keep ``v`` only if
  it is closer to ``o`` than to every already-kept neighbor,
  ``IP(o,v) > IP(u,v)`` for all kept ``u``.
* ``alpha`` — Vamana-style relaxed pruning: reject ``v`` when some kept
  ``u`` has ``alpha * d(u,v) <= d(o,v)`` (alpha > 1 keeps more edges).
* ``angle`` — NSSG-style: reject ``v`` when the angle ``∠(v,o,u)`` with
  some kept ``u`` is below a threshold (default 60 degrees).
* ``none``  — KGraph: keep the raw top-gamma kNN list.

These strategies are what the §VIII-G graph ablation re-assembles.
"""
from __future__ import annotations

from typing import Iterator

import numpy as np
import pandas as pd
from pyspark.sql import SparkSession

STRATEGIES = ("mrng", "alpha", "angle", "none")


def _select_one(
    o: int,
    cand: np.ndarray,
    vecs: np.ndarray,
    gamma: int,
    strategy: str,
    alpha: float,
    cos_thresh: float,
) -> np.ndarray:
    """Apply one vertex's neighbor selection; ``cand`` sorted by IP desc."""
    if strategy == "none":
        return cand[:gamma]
    kept: list[int] = []
    vo = vecs[o]
    for v in cand:
        if len(kept) >= gamma:
            break
        if not kept:
            kept.append(int(v))
            continue
        ku = vecs[kept]  # (|kept|, D)
        if strategy == "mrng":
            # IP(o,v) > IP(u,v) for all kept u
            ok = bool(np.all(vecs[v] @ vo > ku @ vecs[v]))
        elif strategy == "alpha":
            # distances on normalized vectors: d^2 = 2 - 2*IP
            d_ov = max(2.0 - 2.0 * float(vecs[v] @ vo), 0.0)
            d_uv = np.maximum(2.0 - 2.0 * (ku @ vecs[v]), 0.0)
            ok = bool(np.all(alpha * alpha * d_uv > d_ov))
        else:  # angle
            ev = vecs[v] - vo
            eu = ku - vo
            nv = np.linalg.norm(ev)
            nu = np.linalg.norm(eu, axis=1)
            denom = np.maximum(nv * nu, 1e-12)
            cosang = (eu @ ev) / denom
            ok = bool(np.all(cosang < cos_thresh))
        if ok:
            kept.append(int(v))
    return np.asarray(kept, dtype=np.int32)


def select_neighbors(
    spark: SparkSession,
    vecs_b,
    knn: np.ndarray,
    gamma: int,
    *,
    strategy: str = "mrng",
    alpha: float = 1.2,
    angle_deg: float = 60.0,
) -> np.ndarray:
    """Components ②③ as one distributed pass; returns padded (n, gamma).

    ``vecs_b`` is a broadcast of the (n, D) concat matrix; ``knn`` is the
    component-① graph (broadcast here).
    """
    if strategy not in STRATEGIES:
        raise ValueError(f"strategy must be one of {STRATEGIES}")
    n = knn.shape[0]
    sc = spark.sparkContext
    knn_b = sc.broadcast(knn)
    cos_thresh = float(np.cos(np.deg2rad(angle_deg)))

    def prune(batches: Iterator[pd.DataFrame]) -> Iterator[pd.DataFrame]:
        vecs = vecs_b.value
        base = knn_b.value
        for pdf in batches:
            out_ids, out_nbrs = [], []
            for o in pdf["id"].to_numpy():
                direct = base[o]
                direct = direct[direct >= 0]
                cand = np.unique(
                    np.concatenate([direct, base[direct].ravel()])
                )
                cand = cand[(cand != o) & (cand >= 0)]
                ips = vecs[cand] @ vecs[o]
                cand = cand[np.argsort(-ips, kind="stable")]
                out_ids.append(o)
                out_nbrs.append(
                    _select_one(o, cand, vecs, gamma, strategy, alpha, cos_thresh)
                )
            yield pd.DataFrame({"id": out_ids, "nbrs": out_nbrs})

    parts = spark.sparkContext.defaultParallelism
    ids_df = spark.createDataFrame(
        pd.DataFrame({"id": np.arange(n, dtype=np.int64)})
    ).repartition(min(parts, n))
    result = ids_df.mapInPandas(prune, schema="id long, nbrs array<int>").toPandas()
    knn_b.destroy()

    out = np.full((n, gamma), -1, dtype=np.int32)
    for i, row in zip(result["id"].to_numpy(), result["nbrs"]):
        arr = np.asarray(row, dtype=np.int32)[:gamma]
        out[i, : len(arr)] = arr
    return out
