"""Paraphrase-embedding substrate (counter-fitting substitute).

The paper expands descriptors ("serves coffee") into semantically close
phrases using paraphrase-based word embeddings. Offline we build
deterministic vectors: every semantic cluster in ``corpus.vocab.CLUSTERS``
gets a seeded base direction and members get the base plus per-word noise,
so intra-cluster cosine similarity is high (~0.7–0.9, graded per word) and
cross-cluster similarity is ~0. Only the relative ordering matters to
KOKO's semantics, which this preserves.

Public API mirrors what the engine needs: ``similarity(w1, w2)`` for
``similarTo`` conditions, ``expand(descriptor, k)`` → ``E(d) = [(d_i,
k_i)]`` for descriptor conditions.
"""
from __future__ import annotations

import zlib
from functools import lru_cache

import numpy as np

from ..corpus.vocab import CLUSTERS

_DIM = 48
_NOISE = 0.55


def _seeded(name: str, salt: int = 0) -> np.random.Generator:
    return np.random.default_rng([zlib.crc32(name.encode()), salt])


@lru_cache(maxsize=1)
def _vectors() -> dict[str, np.ndarray]:
    vecs: dict[str, np.ndarray] = {}
    for cname, members in CLUSTERS.items():
        base = _seeded(cname, 1).standard_normal(_DIM)
        base /= np.linalg.norm(base)
        for w in members:
            if w in vecs:  # first cluster wins for shared words
                continue
            noise = _seeded(w, 2).standard_normal(_DIM)
            noise *= _NOISE / np.linalg.norm(noise)
            v = base + noise
            vecs[w] = v / np.linalg.norm(v)
    return vecs


def _vector(word: str) -> np.ndarray:
    w = word.lower()
    vecs = _vectors()
    if w in vecs:
        return vecs[w]
    v = _seeded(w, 3).standard_normal(_DIM)
    return v / np.linalg.norm(v)


def similarity(w1: str, w2: str) -> float:
    """Cosine similarity in [0, 1] (negatives clipped — dissimilar)."""
    if w1.lower() == w2.lower():
        return 1.0
    return float(max(0.0, _vector(w1) @ _vector(w2)))


def neighbors(word: str, k: int = 6, min_sim: float = 0.3) -> list[tuple[str, float]]:
    """Known vocabulary words most similar to ``word`` (self first, 1.0)."""
    scored = [(w, similarity(word, w)) for w in _vectors() if w != word.lower()]
    scored = [(w, s) for w, s in scored if s >= min_sim]
    scored.sort(key=lambda t: (-t[1], t[0]))
    return [(word.lower(), 1.0)] + scored[: k - 1]


def expand(descriptor: str, k: int = 8) -> list[tuple[str, float]]:
    """``E(d)``: expansions of a 1–2 word descriptor with scores.

    Each word is replaced by its embedding neighbors; a phrase's score is
    the product of its word scores (the original phrase scores 1.0).
    Deterministic, top-``k`` (a fixed number of expanded terms — the
    paper's current default, per §5).
    """
    words = descriptor.split()
    per_word = [neighbors(w, k=max(3, k // len(words) + 1)) for w in words]
    phrases: dict[str, float] = {}
    def rec(i: int, acc: list[str], score: float) -> None:
        if i == len(words):
            phrase = " ".join(acc)
            phrases[phrase] = max(phrases.get(phrase, 0.0), score)
            return
        for w, s in per_word[i]:
            rec(i + 1, acc + [w], score * s)
    rec(0, [], 1.0)
    out = sorted(phrases.items(), key=lambda t: (-t[1], t[0]))
    return out[:k]
