"""Tokenization and TF-IDF utilities shared by every embedding model.

All "language models" in this reproduction operate over hashed token
features (see DESIGN.md §2), so a single deterministic tokenizer keeps
the model zoo comparable: the differences between models come from how
they *weight and project* tokens, not from what they see.
"""
from __future__ import annotations

import math
import re
import zlib
from collections import Counter
from typing import Iterable

_TOKEN_RE = re.compile(r"[A-Za-z0-9_#@.\-]+")


def tokenize(text: str) -> list[str]:
    """Lowercased word-ish tokens; punctuation-split, order preserved."""
    if text is None:
        return []
    return [t.lower() for t in _TOKEN_RE.findall(str(text))]


def char_ngrams(token: str, n_lo: int = 3, n_hi: int = 5) -> list[str]:
    """Boundary-marked character n-grams of a token (FastText-style)."""
    s = f"<{token}>"
    out: list[str] = []
    for n in range(n_lo, n_hi + 1):
        if len(s) < n:
            continue
        out.extend(s[i : i + n] for i in range(len(s) - n + 1))
    return out


def stable_hash(token: str, salt: str = "") -> int:
    """Deterministic 32-bit hash (process-independent, unlike ``hash``)."""
    return zlib.crc32((salt + token).encode("utf-8"))


def hash_bucket(token: str, n_buckets: int, salt: str = "") -> int:
    return stable_hash(token, salt) % n_buckets


class IdfWeights:
    """Inverse-document-frequency weights fitted over a token corpus.

    A "document" is whatever unit the caller passes (a column, a tuple).
    Unknown tokens at lookup time get the max idf (they are rare by
    definition).
    """

    def __init__(self, documents: Iterable[Iterable[str]]):
        df: Counter[str] = Counter()
        n_docs = 0
        for doc in documents:
            n_docs += 1
            df.update(set(doc))
        self.n_docs = max(1, n_docs)
        self._idf = {
            t: math.log((1 + self.n_docs) / (1 + c)) + 1.0 for t, c in df.items()
        }
        self._max_idf = math.log(1 + self.n_docs) + 1.0

    def __call__(self, token: str) -> float:
        return self._idf.get(token, self._max_idf)

    def top_tokens(self, tokens: list[str], limit: int) -> list[str]:
        """The ``limit`` highest TF-IDF tokens of a document, order kept.

        Mirrors the paper's 512-token cap for column-level LM inputs
        (Sec. 6.2.3): score each distinct token by tf*idf, keep the best
        ``limit``, and emit the original sequence filtered to them.
        """
        if len(tokens) <= limit:
            return list(tokens)
        tf = Counter(tokens)
        keep = {
            t
            for t, _ in sorted(
                tf.items(), key=lambda kv: (-kv[1] * self(kv[0]), kv[0])
            )[:limit]
        }
        # Emit in original order, reserving one slot per kept distinct
        # token so frequent tokens cannot starve rarer (higher-idf) ones.
        unseen = set(keep)
        out: list[str] = []
        for t in tokens:
            if t not in keep:
                continue
            if t in unseen:
                out.append(t)
                unseen.discard(t)
            elif len(out) + len(unseen) < limit:
                out.append(t)
            if len(out) >= limit:
                break
        return out
