"""Tests for the exact top-k scans, oracle-checked against DuckDB.

``topk_sql`` (pure Catalyst) is diffed against a DuckDB
``list_inner_product`` query via ``repro.oracle.assert_equivalent``;
``topk_scan`` (the distributed production path) is then checked against
``topk_sql`` and against the numpy reference, closing the loop.
"""
import numpy as np
import pandas as pd
import pytest

from repro.ann.bruteforce import topk_numpy, topk_scan, topk_sql
from repro.ann.distance import joint_ip_matrix, normalize
from repro.datasets import mitstates_lite
from repro.oracle import assert_equivalent


@pytest.fixture(scope="module")
def ds():
    return mitstates_lite(n=150, nq=12)


def duckdb_topk_sql(weights, k):
    """DuckDB query computing the same joint top-k over list columns."""
    ip = " + ".join(
        f"{w} * list_inner_product(q.q{i}, o.v{i})" for i, w in enumerate(weights)
    )
    return f"""
        SELECT qid, oid, rank, ip_joint FROM (
            SELECT q.qid, o.id AS oid,
                   {ip} AS ip_joint,
                   row_number() OVER (
                       PARTITION BY q.qid ORDER BY {ip} DESC, o.id ASC
                   ) AS rank
            FROM queries q CROSS JOIN objects o
        ) WHERE rank <= {k}
    """


@pytest.mark.parametrize("weights", [[0.5, 0.5], [1.0, 0.0], [0.2, 0.8]])
@pytest.mark.parametrize("k", [1, 5])
def test_topk_sql_matches_duckdb_oracle(spark, ds, weights, k):
    got = topk_sql(ds.queries_df(spark), ds.objects_df(spark), weights, k)
    assert_equivalent(
        got,
        duckdb_topk_sql(weights, k),
        queries=ds.queries_df(spark),
        objects=ds.objects_df(spark),
    )


def test_topk_scan_matches_topk_sql(spark, ds):
    w, k = [0.4, 0.6], 5
    scan = (
        topk_scan(spark, ds.qry_mats, ds.obj_mats, w, k)
        .select("qid", "oid", "rank")
        .toPandas()
        .sort_values(["qid", "rank"])
        .reset_index(drop=True)
    )
    sql = (
        topk_sql(ds.queries_df(spark), ds.objects_df(spark), w, k)
        .select("qid", "oid", "rank")
        .toPandas()
        .sort_values(["qid", "rank"])
        .reset_index(drop=True)
    )
    pd.testing.assert_frame_equal(scan, sql)


@pytest.mark.parametrize("k", [1, 3, 7])
def test_topk_scan_matches_numpy(spark, ds, k):
    w = [0.3, 0.7]
    pdf = topk_scan(spark, ds.qry_mats, ds.obj_mats, w, k).toPandas()
    ids, vals = topk_numpy(ds.qry_mats, ds.obj_mats, w, k)
    for qid in range(ds.nq):
        grp = pdf[pdf.qid == qid].sort_values("rank")
        np.testing.assert_array_equal(grp["oid"].to_numpy(), ids[qid])
        np.testing.assert_allclose(grp["ip_joint"].to_numpy(), vals[qid], rtol=1e-4)


def test_topk_scan_per_modality_ips_consistent(spark, ds):
    w = [0.25, 0.75]
    pdf = topk_scan(spark, ds.qry_mats, ds.obj_mats, w, 4).toPandas()
    recomb = w[0] * pdf["ip_0"] + w[1] * pdf["ip_1"]
    np.testing.assert_allclose(recomb, pdf["ip_joint"], rtol=1e-4)
    # spot-check one ip_0 against numpy
    r = pdf.iloc[0]
    expected = float(ds.qry_mats[0][int(r.qid)] @ ds.obj_mats[0][int(r.oid)])
    assert abs(r.ip_0 - expected) < 1e-4


def test_topk_scan_positive_always_present(spark, ds):
    w = [0.5, 0.5]
    pdf = topk_scan(
        spark, ds.qry_mats, ds.obj_mats, w, 3, positives=ds.gt
    ).toPandas()
    for qid in range(ds.nq):
        grp = pdf[pdf.qid == qid]
        pos = grp[grp.is_pos]
        assert len(pos) == 1
        assert int(pos.iloc[0].oid) == int(ds.gt[qid])


def test_topk_scan_positive_outside_topk_gets_extra_row(spark):
    g = np.random.default_rng(0)
    obj = [normalize(g.standard_normal((50, 4)))]
    qry = [normalize(g.standard_normal((5, 4)))]
    joint = joint_ip_matrix(qry, obj, [1.0])
    # positive = the *worst* object per query, guaranteed outside top-2
    positives = np.argmin(joint, axis=1)
    pdf = topk_scan(spark, qry, obj, [1.0], 2, positives=positives).toPandas()
    for qid in range(5):
        grp = pdf[pdf.qid == qid]
        assert len(grp) == 3  # top-2 + forced positive
        assert int(grp[grp.is_pos].iloc[0]["rank"]) == 3


def test_topk_scan_k_larger_than_n(spark):
    g = np.random.default_rng(1)
    obj = [normalize(g.standard_normal((4, 3)))]
    qry = [normalize(g.standard_normal((2, 3)))]
    pdf = topk_scan(spark, qry, obj, [1.0], 10).toPandas()
    assert (pdf.groupby("qid").size() == 4).all()
