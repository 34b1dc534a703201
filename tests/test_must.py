"""Tests for the MUST facade (repro.core.must)."""
import numpy as np
import pytest

from repro.ann.bruteforce import topk_numpy
from repro.core.must import fit_must
from repro.datasets import mitstates_lite
from repro.eval.metrics import recall_at_k


@pytest.fixture(scope="module")
def ds():
    return mitstates_lite(("resnet50", "lstm"), n=400, nq=40)


def test_fit_with_explicit_weights(spark, ds):
    model = fit_must(spark, ds.obj_mats, weights=[0.3, 0.7], gamma=8, eps=2)
    np.testing.assert_allclose(model.weights, [0.3, 0.7])
    assert model.index is not None
    assert model.weight_result is None


def test_fit_uniform_default(spark, ds):
    model = fit_must(spark, ds.obj_mats, brute=True)
    np.testing.assert_allclose(model.weights, [0.5, 0.5])


def test_fit_learns_weights(spark, ds):
    model = fit_must(
        spark, ds.obj_mats,
        train_qry_mats=[m[:20] for m in ds.qry_mats],
        train_positives=ds.gt[:20],
        brute=True, epochs=4,
    )
    assert model.weight_result is not None
    assert len(model.weight_result.history) == 4
    np.testing.assert_array_equal(model.weights, model.weight_result.weights)


def test_brute_search_equals_numpy(spark, ds):
    w = [0.4, 0.6]
    model = fit_must(spark, ds.obj_mats, weights=w, brute=True)
    out = model.search(ds.qry_mats, k=5)
    exact, vals = topk_numpy(ds.qry_mats, ds.obj_mats, w, 5)
    np.testing.assert_array_equal(out.ids, exact)
    np.testing.assert_allclose(out.ips, vals, rtol=1e-4)


def test_index_search_close_to_brute(spark, ds):
    w = [0.4, 0.6]
    brute = fit_must(spark, ds.obj_mats, weights=w, brute=True)
    idx = fit_must(spark, ds.obj_mats, weights=w, gamma=10, eps=3)
    exact = brute.search(ds.qry_mats, k=10).ids
    out = idx.search(ds.qry_mats, k=10, l=200)
    assert recall_at_k(out.ids, exact, 10) > 0.95


def test_user_weights_change_ranking(spark, ds):
    a = fit_must(spark, ds.obj_mats, weights=[0.95, 0.05], brute=True)
    b = fit_must(spark, ds.obj_mats, weights=[0.05, 0.95], brute=True)
    ra = a.search(ds.qry_mats, k=1).ids[:, 0]
    rb = b.search(ds.qry_mats, k=1).ids[:, 0]
    assert np.mean(ra != rb) > 0.3


def test_brute_search_with_absent_modality(spark, ds):
    w = [0.4, 0.6]
    model = fit_must(spark, ds.obj_mats, weights=w, brute=True)
    out = model.search([None, ds.qry_mats[1]], k=5)
    exact, _ = topk_numpy([None, ds.qry_mats[1]], ds.obj_mats, w, 5)
    np.testing.assert_array_equal(out.ids, exact)
