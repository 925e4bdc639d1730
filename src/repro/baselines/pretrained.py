"""Simulated pre-trained embeddings (substitution S2 in DESIGN.md).

The paper's pre-trained baseline is fastText: subword-aware vectors
trained on a web corpus. Offline we reproduce its two properties that the
experiments actually exercise — (a) string/subword similarity: words
sharing character n-grams get similar vectors; (b) no knowledge of the
datasets' co-occurrence structure — with deterministic hash-seeded
Gaussian n-gram vectors:

    vec(word) = normalise( Σ_{g ∈ ngrams(word) ∪ {word}} N(0, I; seed=hash(g)) )

Like real fastText there is no OOV: any string gets a vector. Multi-word
cells average their word vectors (the "state of the art methods to
combine words in tuples" of §7).
"""
from __future__ import annotations

import hashlib

import numpy as np

from repro.core.embeddings import EmbeddingSpace
from repro.core.tokenize import TOKEN_PREFIX


class FastTextSim:
    """Deterministic fastText-like word-vector oracle."""

    def __init__(self, dim: int = 64, n_min: int = 3, n_max: int = 6, seed: int = 0):
        self.dim = dim
        self.n_min = n_min
        self.n_max = n_max
        self.seed = seed
        self._gram_cache: dict[str, np.ndarray] = {}
        self._word_cache: dict[str, np.ndarray] = {}

    def _gram_vec(self, gram: str) -> np.ndarray:
        v = self._gram_cache.get(gram)
        if v is None:
            h = hashlib.blake2b(
                f"{self.seed}|{gram}".encode(), digest_size=8
            ).digest()
            rng = np.random.default_rng(int.from_bytes(h, "little"))
            v = rng.standard_normal(self.dim)
            self._gram_cache[gram] = v
        return v

    def _grams(self, word: str) -> list[str]:
        padded = f"<{word}>"
        out = [padded]  # whole-word gram, like fastText
        for n in range(self.n_min, self.n_max + 1):
            if len(padded) < n:
                break
            out += [padded[i: i + n] for i in range(len(padded) - n + 1)]
        return out

    def word_vec(self, word: str) -> np.ndarray:
        """Unit vector for a single (already lower-cased) word."""
        w = str(word).strip().lower()
        v = self._word_cache.get(w)
        if v is None:
            acc = np.zeros(self.dim)
            for g in self._grams(w):
                acc += self._gram_vec(g)
            n = np.linalg.norm(acc)
            v = acc / n if n > 0 else acc
            self._word_cache[w] = v
        return v

    def value_vec(self, value: str) -> np.ndarray:
        """Vector for a (possibly multi-word, ``_``-normalised) cell value."""
        words = [w for w in str(value).strip().lower().replace("_", " ").split() if w]
        if not words:
            return np.full(self.dim, 1e-9)
        return np.mean([self.word_vec(w) for w in words], axis=0)

    def token_space(self, tokens: list[str]) -> EmbeddingSpace:
        """EmbeddingSpace over ``tt__``-prefixed token names.

        Used to run the quality tests and TM against pre-trained vectors.
        """
        vectors = {}
        for t in tokens:
            raw = t[len(TOKEN_PREFIX):] if t.startswith(TOKEN_PREFIX) else t
            vectors[t] = self.value_vec(raw)
        return EmbeddingSpace.from_dict(vectors)
