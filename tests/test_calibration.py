"""Phenomenology checks: the synthetic datasets must reproduce the
qualitative shapes the paper's tables rely on (DESIGN.md §2).

These run on numpy exact search only (no index artifacts), at a scale
big enough for stable means — they pin the calibration of the encoder
zoo and dataset knobs.
"""
import numpy as np
import pytest

from repro.ann.bruteforce import topk_numpy
from repro.datasets import (
    celeba_lite,
    imagetext,
    mitstates_lite,
    mscoco_lite,
    shopping_lite,
)
from repro.eval.metrics import recall_at_k

N, NQ = 4000, 200


def rec(ds, w, k, active=None):
    q = [
        m if (active is None or i in active) else None
        for i, m in enumerate(ds.qry_mats)
    ]
    ids, _ = topk_numpy(q, ds.obj_mats, w, k)
    return recall_at_k(ids, ds.gt, k)


def best_joint(ds, k=1):
    return max(
        rec(ds, [1 - w1, w1] + [0.0] * (ds.m - 2), k)
        for w1 in (0.3, 0.5, 0.7, 0.85)
    )


@pytest.fixture(scope="module")
def mit50():
    return mitstates_lite(("resnet50", "lstm"), n=N, nq=NQ)


def test_mitstates_joint_beats_both_single_modalities(mit50):
    joint = best_joint(mit50)
    assert joint > rec(mit50, [1, 0], 1, active=[0]) + 0.3
    assert joint > rec(mit50, [0, 1], 1, active=[1]) + 0.3


def test_mitstates_target_only_weak(mit50):
    """Paper Tab. XIX: image-only @1 ~0.03 (the reference sibling wins)."""
    assert rec(mit50, [1, 0], 1, active=[0]) < 0.15


def test_mitstates_aux_only_moderate(mit50):
    """Paper Tab. XX: LSTM-only @1 ~0.27."""
    r = rec(mit50, [0, 1], 1, active=[1])
    assert 0.1 < r < 0.5


def test_encoder_ordering_resnet(mit50):
    """Paper Tab. III: ResNet50 combos beat ResNet17 combos."""
    mit17 = mitstates_lite(("resnet17", "lstm"), n=N, nq=NQ)
    assert best_joint(mit50) > best_joint(mit17)


def test_encoder_ordering_text(mit50):
    """Paper Tab. III: LSTM combos beat Transformer combos."""
    mit_tr = mitstates_lite(("resnet50", "transformer"), n=N, nq=NQ)
    assert best_joint(mit50) > best_joint(mit_tr) + 0.1


def test_je_clip_beats_je_tirg():
    """Paper Tab. III JE rows: CLIP > TIRG as composition encoder."""
    clip = mitstates_lite(("clip", "lstm"), n=N, nq=NQ)
    tirg = mitstates_lite(("tirg", "lstm"), n=N, nq=NQ)
    assert rec(clip, [1, 0], 1, active=[0]) > rec(tirg, [1, 0], 1, active=[0])


def test_je_much_worse_than_joint():
    """Paper §I: best JE top-1 barely passes 0.4; MUST far above."""
    clip = mitstates_lite(("clip", "lstm"), n=N, nq=NQ)
    je = rec(clip, [1, 0], 1, active=[0])
    assert best_joint(clip) > je + 0.15


def test_celeba_aux_only_weak():
    """Paper Tab. XX: Encoding-only @1 ~0.04 on CelebA."""
    ds = celeba_lite(("clip", "encoding"), n=N, nq=NQ)
    assert rec(ds, [0, 1], 1, active=[1]) < 0.1


def test_shopping_image_only_hopeless():
    """Paper Tab. V: MR image-only @1 ~0.003."""
    ds = shopping_lite("tshirt", ("resnet17", "encoding"), n=N, nq=NQ)
    assert rec(ds, [1, 0], 1, active=[0]) < 0.05


def test_shopping_aux_only_around_point1():
    """Paper Tab. XX: Shopping Encoding-only @1 ~0.096."""
    ds = shopping_lite("tshirt", ("tirg", "encoding"), n=N, nq=NQ)
    r = rec(ds, [0, 1], 1, active=[1])
    assert 0.02 < r < 0.25


def test_shopping_joint_strong():
    """Paper Tab. V: MUST @1 ~0.42-0.47."""
    ds = shopping_lite("tshirt", ("tirg", "encoding"), n=N, nq=NQ)
    assert best_joint(ds) > 0.3


def test_mscoco_hard():
    """Paper Tab. VI: Recall@10 below ~0.25 even for the best method."""
    ds = mscoco_lite(("resnet50", "gru", "resnet50"), n=N, nq=NQ)
    r = max(
        recall_at_k(
            topk_numpy(ds.qry_mats, ds.obj_mats, w, 10)[0], ds.gt, 10
        )
        for w in ([0.25, 0.5, 0.25], [0.33, 0.34, 0.33])
    )
    assert 0.03 < r < 0.4


def test_mscoco_je_nearly_blind():
    """Paper Tab. VI JE(MPC): Recall@10 ~0.02."""
    ds = mscoco_lite(("mpc", "gru", "resnet50"), n=N, nq=NQ)
    ids, _ = topk_numpy([ds.qry_mats[0], None, None], ds.obj_mats, [1, 0, 0], 10)
    assert recall_at_k(ids, ds.gt, 10) < 0.1


def test_imagetext_joint_works_at_scale():
    ds = imagetext(8000, nq=100)
    assert best_joint(ds, k=10) > 0.6
