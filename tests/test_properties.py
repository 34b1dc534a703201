"""Property-based tests (hypothesis) for the numeric kernels."""
import numpy as np
from hypothesis import given, settings
from hypothesis import strategies as st
from hypothesis.extra.numpy import arrays

from repro.ann.distance import concat_weighted, normalize, topk_from_scores
from repro.eval.metrics import recall_at_k

finite = st.floats(-1e3, 1e3, allow_nan=False, width=32)


@given(arrays(np.float32, st.tuples(st.integers(1, 8), st.integers(1, 12)), elements=finite))
@settings(max_examples=50, deadline=None)
def test_normalize_idempotent(mat):
    once = normalize(mat)
    twice = normalize(once)
    np.testing.assert_allclose(once, twice, atol=1e-5)


@given(arrays(np.float32, st.tuples(st.integers(1, 8), st.integers(1, 12)), elements=finite))
@settings(max_examples=50, deadline=None)
def test_normalize_rows_unit_or_zero(mat):
    norms = np.linalg.norm(normalize(mat), axis=1)
    assert np.all((np.abs(norms - 1.0) < 1e-4) | (norms < 1e-6))


@given(
    arrays(np.float64, st.tuples(st.integers(1, 6), st.integers(1, 30)), elements=finite),
    st.integers(1, 35),
)
@settings(max_examples=60, deadline=None)
def test_topk_matches_python_sorted(scores, k):
    idx, vals = topk_from_scores(scores, k)
    for j in range(scores.shape[0]):
        expected = sorted(range(scores.shape[1]), key=lambda i: (-scores[j, i], i))[:k]
        assert idx[j].tolist() == expected
        np.testing.assert_allclose(vals[j], scores[j][expected])


@given(
    st.integers(1, 4).flatmap(
        lambda m: st.tuples(
            st.just(m),
            st.lists(st.floats(0.01, 5.0), min_size=m, max_size=m),
            st.integers(1, 6),
        )
    )
)
@settings(max_examples=40, deadline=None)
def test_concat_weighted_lemma1(params):
    m, weights, n = params
    g = np.random.default_rng(42)
    a = [normalize(g.standard_normal((n, 4))) for _ in range(m)]
    b = [normalize(g.standard_normal((n, 4))) for _ in range(m)]
    lhs = np.einsum("ij,ij->i", concat_weighted(a, weights), concat_weighted(b, weights))
    rhs = sum(w * np.einsum("ij,ij->i", x, y) for w, x, y in zip(weights, a, b))
    np.testing.assert_allclose(lhs, rhs, rtol=1e-3, atol=1e-5)


@given(
    st.integers(1, 5),
    st.integers(1, 10),
    st.integers(1, 20),
    st.integers(0, 2**31 - 1),
)
@settings(max_examples=50, deadline=None)
def test_recall_bounded_and_monotone_in_k(nq, kmax, n_obj, seed):
    g = np.random.default_rng(seed)
    res = g.integers(0, n_obj, (nq, kmax))
    gt = g.integers(0, n_obj, nq)
    prev = 0.0
    for k in range(1, kmax + 1):
        r = recall_at_k(res, gt, k)
        assert 0.0 <= r <= 1.0
        assert r >= prev - 1e-12
        prev = r
