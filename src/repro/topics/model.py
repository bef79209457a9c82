"""Synthetic topic model: the black-box oracle of Section 3.1.

A :class:`TopicModel` provides exactly what the paper requires from
LDA/BTM — ``p_i(w)`` (topic-word probability, many zeros) and keyword →
query-vector inference — without a trained model.  Each topic is a Zipf
distribution over a random support of the vocabulary, so the two skew
properties the paper's pruning relies on hold by construction:

* topic-word mass is concentrated on a few words per topic, and
* a word belongs to only a handful of topics, so an element drawn from
  one or two topics is "high-ranked in very few topics" (Section 4).
"""
from __future__ import annotations

import numpy as np

__all__ = ["TopicModel"]


class TopicModel:
    """Sparse synthetic topic model over an integer vocabulary.

    Parameters
    ----------
    z:
        Number of topics.
    vocab_size:
        Vocabulary size ``m``; words are ids ``0..m-1``.
    seed:
        Deterministic generator seed.
    support:
        Words with non-zero probability per topic. Defaults to
        ``max(30, 3*m//z)`` so supports overlap between topics.
    zipf_a:
        Zipf exponent of the within-topic word distribution.
    """

    def __init__(
        self,
        z: int,
        vocab_size: int,
        *,
        seed: int = 0,
        support: int | None = None,
        zipf_a: float = 1.05,
    ) -> None:
        if z < 1 or vocab_size < 2:
            raise ValueError("need z >= 1 and vocab_size >= 2")
        self.z = z
        self.m = vocab_size
        s = support or max(30, 3 * vocab_size // z)
        s = min(s, vocab_size)
        g = np.random.default_rng(seed)
        # phi[i, w] = p_i(w); rows sum to 1, sparse by construction.
        phi = np.zeros((z, vocab_size))
        ranks = np.arange(1, s + 1, dtype=float)
        base = 1.0 / ranks**zipf_a
        base /= base.sum()
        for i in range(z):
            words = g.choice(vocab_size, size=s, replace=False)
            phi[i, words] = base
        self.phi = phi
        self._col_sum = phi.sum(axis=0)  # for word->topic responsibilities

    # -- oracle interface ------------------------------------------------
    def p_w(self, topic: int, word: int) -> float:
        """``p_i(w)`` — probability of ``word`` under ``topic``."""
        return float(self.phi[topic, word])

    def topics_of_word(self, word: int) -> np.ndarray:
        """Topic ids with non-zero probability for ``word``."""
        return np.nonzero(self.phi[:, word])[0]

    # -- query inference -------------------------------------------------
    def infer(
        self,
        words: np.ndarray,
        freqs: np.ndarray | None = None,
        *,
        trunc: float = 0.03,
        max_topics: int = 8,
    ) -> tuple[np.ndarray, np.ndarray]:
        """Infer a sparse query vector from a keyword pseudo-document.

        Implements the paper's query-by-keyword transform: the keywords
        are a pseudo-document whose topic distribution becomes the query
        vector **x**.  Inference averages per-word topic
        responsibilities ``p_i(w)/Σ_j p_j(w)`` weighted by frequency —
        a single E-step with a uniform prior, adequate for a synthetic
        oracle.  Entries below ``trunc`` (after normalisation) are
        dropped and the rest renormalised, matching the observation that
        query vectors have few non-zero entries ``d``.

        Returns ``(topic_ids, weights)`` with ``weights.sum() == 1``
        (both empty if no keyword has topical mass).
        """
        words = np.asarray(words, dtype=int)
        if freqs is None:
            freqs = np.ones(len(words))
        x = np.zeros(self.z)
        for w, c in zip(words, freqs):
            tot = self._col_sum[w]
            if tot > 0:
                x += c * self.phi[:, w] / tot
        if x.sum() <= 0:
            return np.empty(0, dtype=int), np.empty(0)
        x /= x.sum()
        keep = x >= trunc
        if not keep.any():
            keep = x == x.max()
        # keep at most max_topics entries — query vectors are sparse (small d)
        ids = np.nonzero(keep)[0]
        if len(ids) > max_topics:
            ids = ids[np.argsort(-x[ids])[:max_topics]]
            ids = np.sort(ids)
        wts = x[ids] / x[ids].sum()
        return ids, wts

    # -- sampling helpers (used by the corpus generator) -----------------
    def sample_words(self, topic_ids: np.ndarray, rng: np.random.Generator) -> np.ndarray:
        """Draw one word per entry of ``topic_ids`` from ``p_i(w)``."""
        out = np.empty(len(topic_ids), dtype=int)
        for j, i in enumerate(topic_ids):
            out[j] = rng.choice(self.m, p=self.phi[i])
        return out
