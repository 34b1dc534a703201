"""Simulated encoder zoo (substitute for ResNet/LSTM/CLIP/... — DESIGN.md §2).

Each named encoder is a fixed random projection of the relevant latent
subspace plus Gaussian noise with an encoder-specific magnitude. The only
property the paper's tables exercise is the *relative embedding error* of
the encoders, so noise sigma is the calibrated knob:

* image:  sigma(ResNet50) < sigma(ResNet17)
* text:   sigma(Encoding) < sigma(LSTM) < sigma(GRU) < sigma(Transformer)
* composition (query side): sigma(CLIP) < sigma(TIRG) < sigma(MPC)

Channel semantics (what each modality *observes*):

* ``target`` with a unimodal image encoder (Option 1, Fig. 4(f)): objects
  embed ``[content; beta*state]``; the query embeds the **reference**
  image ``[content_ref; beta*state_ref]`` — i.e. the right instance in
  the *wrong* state, exactly the paper's "fresh cheese" input.
* ``target`` with a multimodal encoder (Option 2): objects embed the same
  ``[content; beta*state]`` (the encoder's image tower, ``obj_sigma``);
  the query embeds the *fused* intent ``[content_ref; beta*state_tgt]``
  with the larger composition error ``sigma``.
* ``text``: objects embed their state latent; the query embeds the
  *desired* state (``q_state_tgt``).
* ``image_view`` (extra modalities, m > 2): an independent projection of
  ``[content; beta*state]``; queries again embed the reference.

All outputs are L2-normalized so IP is the similarity.
"""
from __future__ import annotations

import hashlib
from dataclasses import dataclass

import numpy as np

from repro.ann.distance import normalize
from repro.encoders.latent import LatentWorld


@dataclass(frozen=True)
class EncoderSpec:
    """A named encoder: projection dim + noise magnitudes.

    ``sigma`` is the embedding noise applied to both sides for unimodal
    encoders and to the *query composition* for multimodal encoders,
    whose object tower uses ``obj_sigma``.
    """

    name: str
    kind: str  # 'image' | 'text' | 'composition'
    dim: int
    sigma: float
    obj_sigma: float | None = None
    beta: float = 0.5  # how strongly the image modality encodes state
    # Composition "modality gap" (paper §I, [26]): fraction of the
    # *reference* state that leaks into the fused vector because the
    # encoder under-applies the textual modification.
    drift: float = 0.0


# Calibrated so the paper's encoder ranking emerges (see DESIGN.md §2 and
# tests/test_calibration.py). dims: image 32, text 16.
REGISTRY: dict[str, EncoderSpec] = {
    s.name: s
    for s in [
        EncoderSpec("resnet17", "image", 32, sigma=0.50),
        EncoderSpec("resnet50", "image", 32, sigma=0.28),
        EncoderSpec("lstm", "text", 16, sigma=0.35),
        EncoderSpec("transformer", "text", 16, sigma=0.80),
        EncoderSpec("gru", "text", 16, sigma=0.55),
        EncoderSpec("encoding", "text", 16, sigma=0.02),
        EncoderSpec("clip", "composition", 32, sigma=0.90, obj_sigma=0.30, drift=0.25),
        EncoderSpec("tirg", "composition", 32, sigma=1.30, obj_sigma=0.35, drift=0.45),
        EncoderSpec("mpc", "composition", 32, sigma=1.60, obj_sigma=0.40, drift=0.55),
    ]
}


def spec(name: str) -> EncoderSpec:
    try:
        return REGISTRY[name]
    except KeyError:
        raise KeyError(f"unknown encoder {name!r}; known: {sorted(REGISTRY)}") from None


def _rng(*parts) -> np.random.Generator:
    """Deterministic RNG from structured parts (stable across runs)."""
    h = hashlib.sha256("|".join(str(p) for p in parts).encode()).digest()
    return np.random.default_rng(int.from_bytes(h[:8], "little"))


def _projection(g: np.random.Generator, d_in: int, d_out: int) -> np.ndarray:
    return (g.standard_normal((d_in, d_out)) / np.sqrt(d_in)).astype(np.float32)


def _embed(
    g: np.random.Generator, latent: np.ndarray, proj: np.ndarray, sigma: float
) -> np.ndarray:
    """Project, then add noise *relative to the signal norm*.

    The projected signal is unit-normalized and the noise has expected
    norm ``sigma``, so two encodings of the same latent have expected IP
    ``~1/(1+sigma^2)`` — ``sigma`` is an interpretable encoder-error knob
    independent of the embedding dimension.
    """
    d = proj.shape[1]
    signal = normalize(latent @ proj)
    noise = (sigma / np.sqrt(d)) * g.standard_normal((latent.shape[0], d)).astype(
        np.float32
    )
    return normalize(signal + noise)


def encode_channel(
    world: LatentWorld, enc_name: str, modality: int
) -> tuple[np.ndarray, np.ndarray]:
    """Embed one modality of a world: returns ``(obj_mat, qry_mat)``.

    ``modality`` selects the channel role: 0 = target (Option 1 or 2 by
    encoder kind), text encoders = auxiliary text, image encoders at
    modality >= 1 = extra image views.
    """
    e = spec(enc_name)
    proj_rng = _rng("proj", world.cfg.seed, modality, e.name)
    noise_rng = _rng("noise", world.cfg.seed, modality, e.name)

    if e.kind == "text":
        # The text channel observes the state latent plus (optionally) a
        # content mention with gain kappa — "moldy *cheese*" names the
        # noun as well as the adjective (dataset knob, DESIGN.md §2).
        kappa = world.cfg.text_content_gain
        proj = _projection(proj_rng, world.cfg.d_state + world.cfg.d_content, e.dim)
        obj_lat = np.concatenate([world.state, kappa * world.content], axis=1)
        qry_lat = np.concatenate([world.q_state_tgt, kappa * world.q_content], axis=1)
        return (
            _embed(noise_rng, obj_lat, proj, e.sigma),
            _embed(noise_rng, qry_lat, proj, e.sigma),
        )

    d_in = world.cfg.d_content + world.cfg.d_state
    proj = _projection(proj_rng, d_in, e.dim)
    obj_lat = np.concatenate([world.content, e.beta * world.state], axis=1)

    if e.kind == "composition":
        if modality != 0:
            raise ValueError("composition encoders only encode the target modality")
        obj = _embed(noise_rng, obj_lat, proj, e.obj_sigma)
        # modality gap: the fused state under-applies the modification,
        # keeping `drift` of the reference state.
        fused_state = (1.0 - e.drift) * world.q_state_tgt + e.drift * world.q_state_ref
        q_lat = np.concatenate([world.q_content, e.beta * fused_state], axis=1)
        qry = _embed(noise_rng, q_lat, proj, e.sigma)
        return obj, qry

    # unimodal image encoder: query embeds the *reference* image
    obj = _embed(noise_rng, obj_lat, proj, e.sigma)
    q_lat = np.concatenate([world.q_content, e.beta * world.q_state_ref], axis=1)
    qry = _embed(noise_rng, q_lat, proj, e.sigma)
    return obj, qry
