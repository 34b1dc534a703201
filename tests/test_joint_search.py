"""Tests for the distributed joint search (repro.core.joint_search)."""
import numpy as np
import pytest

from repro.ann.beam_search import beam_search
from repro.ann.bruteforce import topk_numpy
from repro.core.fused_index import build_fused_index
from repro.core.joint_search import joint_search
from repro.datasets import mitstates_lite
from repro.eval.metrics import recall_at_k


@pytest.fixture(scope="module")
def setup(spark):
    ds = mitstates_lite(("resnet50", "lstm"), n=400, nq=30)
    w = [0.4, 0.6]
    index = build_fused_index(spark, ds.obj_mats, w, gamma=10, eps=3, seed=0)
    return ds, w, index


def test_output_shapes(spark, setup):
    ds, w, index = setup
    out = joint_search(spark, ds.qry_mats, ds.obj_mats, index, 5, 50, seed=0)
    assert out.ids.shape == (30, 5)
    assert out.ips.shape == (30, 5)
    assert out.elapsed_s > 0 and out.qps > 0
    assert out.stats["n_expanded"] > 0


def test_matches_local_kernel(spark, setup):
    """The distributed job is exactly the per-query kernel fanned out."""
    ds, w, index = setup
    out = joint_search(spark, ds.qry_mats, ds.obj_mats, index, 5, 40, seed=3)
    for j in (0, 7, 29):
        ids, ips, _ = beam_search(
            [m[j] for m in ds.qry_mats], ds.obj_mats, index.weights,
            index.graph.nbrs, index.graph.seed_vertex, 5, 40,
            rng=np.random.default_rng((3 << 20) + j),
        )
        np.testing.assert_array_equal(out.ids[j], ids)


def test_high_recall_vs_exact(spark, setup):
    ds, w, index = setup
    exact, _ = topk_numpy(ds.qry_mats, ds.obj_mats, w, 10)
    out = joint_search(spark, ds.qry_mats, ds.obj_mats, index, 10, 200, seed=0)
    assert recall_at_k(out.ids, exact, 10) > 0.95


def test_absent_modality(spark, setup):
    ds, w, index = setup
    out = joint_search(
        spark, [ds.qry_mats[0], None], ds.obj_mats, index, 5, 300, seed=0
    )
    exact, _ = topk_numpy([ds.qry_mats[0], None], ds.obj_mats, w, 5)
    assert recall_at_k(out.ids, exact, 5) > 0.9


def test_optimize_flag_preserves_results(spark, setup):
    ds, w, index = setup
    a = joint_search(spark, ds.qry_mats, ds.obj_mats, index, 5, 60, optimize=True, seed=1)
    b = joint_search(spark, ds.qry_mats, ds.obj_mats, index, 5, 60, optimize=False, seed=1)
    np.testing.assert_array_equal(a.ids, b.ids)
    assert b.stats["n_dots_saved"] == 0


def test_optimize_saves_dots_with_dominant_modality(spark, setup):
    ds, _, _ = setup
    w = [0.9, 0.1]
    index = build_fused_index(spark, ds.obj_mats, w, gamma=10, eps=2, seed=0)
    out = joint_search(
        spark, ds.qry_mats, ds.obj_mats, index, 5, 20, optimize=True, seed=1
    )
    assert out.stats["n_dots_saved"] > 0
