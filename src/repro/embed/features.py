"""Hashed bag-of-token feature vectors.

Every embedding model in the zoo starts from the same kind of feature:
tokens hashed into ``n_buckets`` with signed counts (feature hashing).
Models differ in bucket count (capacity → collision rate), idf
weighting, char-n-gram augmentation and the projection applied on top —
that is where the quality differences the paper measures come from.
"""
from __future__ import annotations

import numpy as np

from repro.tokenize import IdfWeights, char_ngrams, hash_bucket, stable_hash, tokenize

# Serialization markers ([CLS]/[SEP] tokenize to these) are structural,
# not content — a real LM treats them as special tokens. They would
# otherwise dominate unweighted bag-of-token cosine similarity.
_SPECIAL_TOKENS = frozenset({"cls", "sep"})


class HashedFeaturizer:
    """Tokens -> dense hashed feature vector.

    ``salt`` namespaces the hash per model family so two models never
    share a feature space by accident. ``use_ngrams`` adds FastText-style
    character n-grams; ``idf`` (optional) reweights tokens by rarity.
    """

    def __init__(
        self,
        n_buckets: int,
        *,
        salt: str,
        use_ngrams: bool = False,
        idf: IdfWeights | None = None,
    ):
        self.n_buckets = n_buckets
        self.salt = salt
        self.use_ngrams = use_ngrams
        self.idf = idf

    def _expand(self, tokens: list[str]) -> list[str]:
        tokens = [t for t in tokens if t not in _SPECIAL_TOKENS]
        if not self.use_ngrams:
            return tokens
        out = list(tokens)
        for t in tokens:
            out.extend(char_ngrams(t))
        return out

    def vector_from_tokens(self, tokens: list[str]) -> np.ndarray:
        v = np.zeros(self.n_buckets)
        for t in self._expand(tokens):
            w = self.idf(t) if self.idf is not None else 1.0
            sign = 1.0 if stable_hash(t, self.salt + "#sign") % 2 == 0 else -1.0
            v[hash_bucket(t, self.n_buckets, self.salt)] += sign * w
        n = np.linalg.norm(v)
        return v / n if n > 0 else v

    def vector(self, text: str) -> np.ndarray:
        return self.vector_from_tokens(tokenize(text))

    def matrix(self, texts: list[str]) -> np.ndarray:
        if not texts:
            return np.zeros((0, self.n_buckets))
        return np.stack([self.vector(t) for t in texts])
