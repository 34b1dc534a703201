"""Latent-factor model standing in for the paper's real media.

The paper's datasets pair a *target* modality (image/audio/video) with
auxiliary modalities (free text or structured attributes). We model every
object as an (instance, state) pair:

* **content** latent ``c`` — what the instance *is* (a face identity, a
  noun like "cheese", a garment). Built hierarchically: a class center
  (noun / identity group / product type) plus instance-level jitter, so
  instances of the same class are confusable exactly the way two cheeses
  are.
* **state** latent ``s`` — mutable attributes ("moldy", "smiling",
  "white/jersey"). Drawn from a pool of state centers plus small
  object-level jitter.

A query targets one ground-truth object ``a``: its target-modality input
is a *reference* sibling of ``a`` (same instance, different state — the
"fresh cheese" photo) and its auxiliary input describes ``a``'s state
("change state to moldy"). This is the generative structure that makes
the paper's phenomena appear: target-only search finds the right instance
in the wrong state, auxiliary-only search finds the right state on random
instances, and only a weighted joint search pins down ``a``.

Substitution is documented in DESIGN.md §2.
"""
from __future__ import annotations

from dataclasses import dataclass

import numpy as np


@dataclass(frozen=True)
class LatentConfig:
    """Knobs of the generative model (defaults match DESIGN.md §6)."""

    n_objects: int = 2000
    n_queries: int = 200
    d_content: int = 24
    d_state: int = 12
    n_classes: int = 40          # nouns / identity groups / product types
    states_per_instance: int = 3  # sibling states per instance (>=2)
    n_state_centers: int = 30     # pool of adjectives / attribute combos
    class_spread: float = 0.55    # instance jitter around its class center
    instance_spread: float = 0.0  # extra per-object content jitter (same instance)
    state_spread: float = 0.25    # object jitter around its state center
    text_content_gain: float = 0.0  # how much the text mentions content ("moldy *cheese*")
    query_state_jitter: float = 0.10  # wording noise of the auxiliary text
    seed: int = 0


@dataclass
class LatentWorld:
    """Latents for objects and queries; every encoder reads from here.

    Arrays (all float32, rows L2-normalized where noted):

    * ``content`` (n, d_content), ``state`` (n, d_state) — object latents.
    * ``instance_id``/``class_id``/``state_id`` (n,) — group labels.
    * ``gt`` (nq,) — index of each query's ground-truth object.
    * ``ref`` (nq,) — index of the reference object (same instance as the
      ground truth, different state) shown as the target-modality input.
    * ``q_content`` (nq, d_content) — content latent of the reference.
    * ``q_state_ref`` (nq, d_state) — state latent of the reference (what
      the target-modality input actually depicts).
    * ``q_state_tgt`` (nq, d_state) — the state *category* latent the
      auxiliary text asks for ("change state to moldy" names the state
      center, not the ground-truth object's idiosyncratic jitter).
    """

    cfg: LatentConfig
    content: np.ndarray
    state: np.ndarray
    instance_id: np.ndarray
    class_id: np.ndarray
    state_id: np.ndarray
    gt: np.ndarray
    ref: np.ndarray
    q_content: np.ndarray
    q_state_ref: np.ndarray
    q_state_tgt: np.ndarray

    @property
    def n(self) -> int:
        return self.content.shape[0]

    @property
    def nq(self) -> int:
        return self.gt.shape[0]


def _unit_rows(g: np.random.Generator, n: int, d: int) -> np.ndarray:
    m = g.standard_normal((n, d)).astype(np.float32)
    m /= np.linalg.norm(m, axis=1, keepdims=True)
    return m


def _jitter(g: np.random.Generator, shape: tuple[int, int], spread: float) -> np.ndarray:
    """Noise with expected *norm* ``spread`` (not per-dim std), so spread
    knobs are relative to the unit-norm latent cores they perturb."""
    return (spread / np.sqrt(shape[1])) * g.standard_normal(shape).astype(np.float32)


def make_world(cfg: LatentConfig) -> LatentWorld:
    """Deterministically sample a latent world from ``cfg``."""
    if cfg.states_per_instance < 2:
        raise ValueError("states_per_instance must be >= 2 to form queries")
    g = np.random.default_rng(cfg.seed)
    n = cfg.n_objects
    n_inst = max(1, n // cfg.states_per_instance)

    class_centers = _unit_rows(g, cfg.n_classes, cfg.d_content)
    inst_class = g.integers(0, cfg.n_classes, n_inst)
    inst_content = class_centers[inst_class] + _jitter(
        g, (n_inst, cfg.d_content), cfg.class_spread
    )
    inst_content /= np.linalg.norm(inst_content, axis=1, keepdims=True)

    state_centers = _unit_rows(g, cfg.n_state_centers, cfg.d_state)

    # Objects: round-robin instances, each instance cycles through distinct
    # state centers so every instance has >= 2 sibling states.
    instance_id = np.arange(n) % n_inst
    slot = np.arange(n) // n_inst  # which sibling slot of the instance
    inst_state_perm = np.stack(
        [g.permutation(cfg.n_state_centers)[: cfg.states_per_instance] for _ in range(n_inst)]
    )
    state_id = inst_state_perm[instance_id, slot % cfg.states_per_instance]

    content = inst_content[instance_id]
    if cfg.instance_spread > 0:
        content = content + _jitter(g, content.shape, cfg.instance_spread)
    content /= np.linalg.norm(content, axis=1, keepdims=True)

    state = state_centers[state_id] + _jitter(g, (n, cfg.d_state), cfg.state_spread)
    state /= np.linalg.norm(state, axis=1, keepdims=True)

    # Queries: ground truth a, reference = sibling of a with a different
    # state. Siblings exist whenever the instance occupies >= 2 slots.
    obj_by_inst: dict[int, list[int]] = {}
    for i, inst in enumerate(instance_id):
        obj_by_inst.setdefault(int(inst), []).append(i)
    eligible = [ids for ids in obj_by_inst.values() if len(ids) >= 2]
    gt_list, ref_list = [], []
    for _ in range(cfg.n_queries):
        ids = eligible[g.integers(0, len(eligible))]
        a, r = g.choice(len(ids), 2, replace=False)
        gt_list.append(ids[a])
        ref_list.append(ids[r])
    gt = np.asarray(gt_list, dtype=np.int64)
    ref = np.asarray(ref_list, dtype=np.int64)

    # The auxiliary text names the target state *category* with some
    # wording noise, not the ground-truth object's own jittered state.
    q_state_tgt = state_centers[state_id[gt]] + _jitter(
        g, (cfg.n_queries, cfg.d_state), cfg.query_state_jitter
    )
    q_state_tgt /= np.linalg.norm(q_state_tgt, axis=1, keepdims=True)

    return LatentWorld(
        cfg=cfg,
        content=content,
        state=state,
        instance_id=instance_id.astype(np.int64),
        class_id=inst_class[instance_id].astype(np.int64),
        state_id=state_id.astype(np.int64),
        gt=gt,
        ref=ref,
        q_content=content[ref],
        q_state_ref=state[ref],
        q_state_tgt=q_state_tgt,
    )
