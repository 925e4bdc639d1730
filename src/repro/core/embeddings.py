"""Embedding construction (paper §4.3) and the embedding-space API.

Training uses ``pyspark.ml.feature.Word2Vec`` — MLlib's distributed
Skip-Gram with hierarchical softmax, the paper's default learning method
(substitution S3 in DESIGN.md; CBOW appears only in ablation prose).

The trained vectors are collected into an :class:`EmbeddingSpace`, a small
numpy-backed index exposing exactly the operations the paper's integration
algorithms need: cosine kNN, gensim-style ``doesnt_match`` (for the
MA/MR/MC quality tests of §7.1) and prefix sub-spaces (RID-only, CID-only).
"""
from __future__ import annotations

from dataclasses import dataclass

import numpy as np
from pyspark.ml.feature import Word2Vec
from pyspark.sql import DataFrame

from repro.core.tokenize import CID_PREFIX, RID_PREFIX, TOKEN_PREFIX


@dataclass(frozen=True)
class W2VConfig:
    """Hyper-parameters of §7's default configuration (scaled per DESIGN §5)."""

    dim: int = 64
    window: int = 3
    min_count: int = 1
    max_iter: int = 1
    seed: int = 42
    num_partitions: int = 4


class EmbeddingSpace:
    """Immutable word → vector index with cosine geometry.

    Vectors are L2-normalised at construction, so dot products *are*
    cosine similarities throughout.
    """

    def __init__(self, words: list[str], matrix: np.ndarray):
        if len(words) != matrix.shape[0]:
            raise ValueError("words/matrix length mismatch")
        order = np.argsort(np.asarray(words, dtype=object))
        self.words = [words[i] for i in order]
        m = np.asarray(matrix, dtype=np.float64)[order]
        norms = np.linalg.norm(m, axis=1, keepdims=True)
        norms[norms == 0] = 1.0
        self.matrix = m / norms
        self._index = {w: i for i, w in enumerate(self.words)}

    # -- lookup ---------------------------------------------------------
    def __contains__(self, word: str) -> bool:
        return word in self._index

    def __len__(self) -> int:
        return len(self.words)

    @property
    def dim(self) -> int:
        return self.matrix.shape[1]

    def vec(self, word: str) -> np.ndarray:
        """Unit vector of ``word`` (KeyError when out of vocabulary)."""
        return self.matrix[self._index[word]]

    def sim(self, a: str, b: str) -> float:
        """Cosine similarity of two in-vocabulary words."""
        return float(self.vec(a) @ self.vec(b))

    # -- retrieval ------------------------------------------------------
    def knn_vec(self, v: np.ndarray, k: int, candidates: list[str] | None = None):
        """Top-``k`` most-cosine-similar words to vector ``v``.

        ``candidates`` restricts the searched vocabulary (e.g. "RIDs of the
        other dataset" in Algorithm 6). Returns ``[(word, sim), ...]`` in
        descending similarity, deterministic tie-break on word.
        """
        n = np.linalg.norm(v)
        if n == 0:
            raise ValueError("zero query vector")
        v = v / n
        if candidates is None:
            cand_idx = np.arange(len(self.words))
        else:
            cand_idx = np.array([self._index[c] for c in candidates], dtype=np.int64)
        sims = self.matrix[cand_idx] @ v
        k = min(k, len(cand_idx))
        # stable deterministic order: sort by (-sim, word)
        order = np.lexsort((np.asarray([self.words[i] for i in cand_idx], dtype=object), -sims))[:k]
        return [(self.words[cand_idx[i]], float(sims[i])) for i in order]

    def knn(self, word: str, k: int, candidates: list[str] | None = None):
        """Top-``k`` neighbours of ``word`` (itself excluded)."""
        out = self.knn_vec(self.vec(word), k + 1, candidates)
        return [(w, s) for w, s in out if w != word][:k]

    def doesnt_match(self, words: list[str]) -> str:
        """gensim-style odd-one-out: the word least similar to the mean.

        Raises KeyError when any word is out of vocabulary — callers of the
        MA/MR/MC tests count that as a failed test (§7.1 semantics).
        """
        vs = np.stack([self.vec(w) for w in words])
        mean = vs.mean(axis=0)
        mean /= np.linalg.norm(mean)
        sims = vs @ mean
        return words[int(np.argmin(sims))]

    # -- sub-spaces -----------------------------------------------------
    def words_with_prefix(self, prefix: str) -> list[str]:
        """All vocabulary entries in a node namespace, sorted."""
        return [w for w in self.words if w.startswith(prefix)]

    def rids(self, dataset_idx: int | None = None) -> list[str]:
        p = RID_PREFIX if dataset_idx is None else f"{RID_PREFIX}{dataset_idx}_"
        return self.words_with_prefix(p)

    def cids(self, dataset_idx: int | None = None) -> list[str]:
        p = CID_PREFIX if dataset_idx is None else f"{CID_PREFIX}{dataset_idx}_"
        return self.words_with_prefix(p)

    def tokens(self) -> list[str]:
        return self.words_with_prefix(TOKEN_PREFIX)

    @classmethod
    def from_dict(cls, vectors: dict[str, np.ndarray]) -> "EmbeddingSpace":
        words = list(vectors)
        return cls(words, np.stack([vectors[w] for w in words]))


def train_word2vec(sentences: DataFrame, cfg: W2VConfig) -> EmbeddingSpace:
    """Train MLlib Word2Vec over a ``sentence array<string>`` corpus."""
    w2v = Word2Vec(
        vectorSize=cfg.dim,
        windowSize=cfg.window,
        minCount=cfg.min_count,
        maxIter=cfg.max_iter,
        seed=cfg.seed,
        numPartitions=cfg.num_partitions,
        inputCol="sentence",
        outputCol="vec",
    )
    model = w2v.fit(sentences.select("sentence"))
    pdf = model.getVectors().toPandas()
    words = pdf["word"].tolist()
    matrix = np.stack([np.asarray(v) for v in pdf["vector"]])
    return EmbeddingSpace(words, matrix)
