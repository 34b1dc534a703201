"""Similarity kernels shared by every index and search path.

All vectors are L2-normalized per modality (paper §III), so inner product
(IP) is the similarity and ``IP = 1 - 0.5 * ||a-b||^2`` (paper Eq. 8).
The *joint* similarity between multi-vector objects is the weighted sum of
per-modality IPs with weights ``w_i = omega_i^2`` (paper Lemma 1):

    IP(q_hat, o_hat) = sum_i w_i * IP(phi_i(q), phi_i(o))

Numpy kernels operate on per-modality matrices; the Spark-SQL expression
builder produces a Catalyst ``Column`` for array<double> columns so pure
DataFrame query paths stay oracle-checkable against DuckDB.
"""
from __future__ import annotations

from typing import Sequence

import numpy as np
from pyspark.sql import Column
from pyspark.sql import functions as F


def normalize(mat: np.ndarray) -> np.ndarray:
    """L2-normalize rows of ``mat``; zero rows are left at zero."""
    mat = np.asarray(mat, dtype=np.float32)
    norms = np.linalg.norm(mat, axis=-1, keepdims=True)
    norms[norms == 0] = 1.0
    return mat / norms


def ip_matrix(queries: np.ndarray, objects: np.ndarray) -> np.ndarray:
    """Pairwise IP between rows of ``queries`` (nq,d) and ``objects`` (n,d)."""
    return queries @ objects.T


def joint_ip_matrix(
    q_mats: Sequence[np.ndarray],
    o_mats: Sequence[np.ndarray],
    weights: Sequence[float],
) -> np.ndarray:
    """Joint similarity matrix (nq, n) per Lemma 1.

    Modalities absent from the query (``q_mats[i] is None``) contribute
    zero, matching the paper's ``omega_i = 0 for t <= i < m`` rule.
    """
    out: np.ndarray | None = None
    for q, o, w in zip(q_mats, o_mats, weights):
        if q is None or w == 0.0:
            continue
        term = (q @ o.T) * np.float32(w)
        out = term if out is None else out + term
    if out is None:
        raise ValueError("query has no active modalities")
    return out


def concat_weighted(mats: Sequence[np.ndarray], weights: Sequence[float]) -> np.ndarray:
    """Concatenated vectors ``[sqrt(w_0)*v_0, ..., sqrt(w_m-1)*v_m-1]``.

    A plain dot product of two such concatenations equals the joint
    similarity (Lemma 1), which is what the fused index is built on.
    """
    parts = [m * np.float32(np.sqrt(w)) for m, w in zip(mats, weights)]
    return np.ascontiguousarray(np.concatenate(parts, axis=1), dtype=np.float32)


def topk_from_scores(scores: np.ndarray, k: int) -> tuple[np.ndarray, np.ndarray]:
    """Row-wise top-k (indices, values) by descending score, ties by index.

    Deterministic: a *stable* sort on descending score, so ties resolve
    to the smallest index — matching the SQL/DuckDB oracle's
    ``ORDER BY ip DESC, id ASC``.
    """
    n = scores.shape[-1]
    k = min(k, n)
    idx = np.argsort(-scores, axis=-1, kind="stable")[..., :k]
    vals = np.take_along_axis(scores, idx, axis=-1)
    return idx, vals


def array_ip_col(a: str | Column, b: str | Column) -> Column:
    """Catalyst expression for the IP of two ``array<double>`` columns.

    Built from ``zip_with`` + ``aggregate`` so the whole scan stays inside
    Spark SQL (no UDF) and can be diffed against DuckDB's
    ``list_inner_product`` by the oracle.
    """
    a = F.col(a) if isinstance(a, str) else a
    b = F.col(b) if isinstance(b, str) else b
    prod = F.zip_with(a, b, lambda x, y: x * y)
    return F.aggregate(prod, F.lit(0.0), lambda acc, x: acc + x)


def joint_ip_col(
    q_cols: Sequence[str | Column | None],
    o_cols: Sequence[str | Column],
    weights: Sequence[float],
) -> Column:
    """Catalyst expression for the joint similarity of Lemma 1."""
    total: Column | None = None
    for q, o, w in zip(q_cols, o_cols, weights):
        if q is None or w == 0.0:
            continue
        term = array_ip_col(q, o) * F.lit(float(w))
        total = term if total is None else total + term
    if total is None:
        raise ValueError("query has no active modalities")
    return total
