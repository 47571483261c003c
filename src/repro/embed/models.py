"""The embedding model zoo: FastText/Glove/BERT/RoBERTa/sBERT/Starmie analogs.

Each "model" is a seeded random projection over hashed token features,
plus model-specific behaviours that reproduce the *mechanisms* the paper
attributes results to (DESIGN.md §2):

- capacity: hash-bucket count (fewer buckets → more collisions; the
  "small" BERT gets 512, the larger models 2048);
- idf weighting: the stronger LMs weight rare tokens up;
- char n-grams: FastText sees sub-word units;
- anisotropy: raw BERT/RoBERTa embeddings famously occupy a narrow cone,
  so every embedding carries a strong shared bias vector → all cosine
  similarities are high → a raw LM cannot threshold-separate unionable
  from non-unionable tuples (the paper's coin-toss rows in Fig. 6).
  sBERT was trained to reduce this, so it gets a small bias;
- table context (Starmie): the column embedding is blended with the
  table's mean column embedding, which is exactly why the paper finds
  Starmie columns of one table too close for good alignment.

Euclidean distances (used for column alignment) are invariant to the
shared bias; cosine distances (used for tuple representation) are not —
matching how the same models can align columns acceptably yet fail at
tuple unionability.
"""
from __future__ import annotations

from dataclasses import dataclass

import numpy as np

from repro.embed.features import HashedFeaturizer
from repro.tokenize import IdfWeights, stable_hash, tokenize

EMBED_DIM = 64
COLUMN_TOKEN_LIMIT = 512  # the paper's LM input cap, kept verbatim


@dataclass(frozen=True)
class ModelSpec:
    name: str
    n_buckets: int
    use_ngrams: bool
    use_idf: bool
    bias_strength: float  # anisotropy of the raw embedding space
    normalize_output: bool


_SPECS = {
    "fasttext": ModelSpec("fasttext", 1024, True, False, 0.0, False),
    "glove": ModelSpec("glove", 1024, False, False, 0.0, False),
    "bert": ModelSpec("bert", 512, False, False, 4.0, False),
    "roberta": ModelSpec("roberta", 2048, False, True, 4.0, False),
    "sbert": ModelSpec("sbert", 2048, False, True, 0.8, True),
    # Starmie's encoder is RoBERTa-based; the table-context blending is
    # applied by ``embed_table_columns``.
    "starmie": ModelSpec("starmie", 2048, False, True, 0.0, True),
}
MODEL_NAMES = tuple(_SPECS)


class EmbeddingModel:
    """A deterministic text -> R^d embedding space."""

    def __init__(self, spec: ModelSpec, idf: IdfWeights | None = None):
        self.spec = spec
        self.idf = idf if spec.use_idf else None
        rng = np.random.default_rng(stable_hash(spec.name, "proj"))
        self.P = rng.normal(0.0, 1.0 / np.sqrt(EMBED_DIM), (spec.n_buckets, EMBED_DIM))
        bias = rng.normal(0.0, 1.0, EMBED_DIM)
        self.bias = spec.bias_strength * bias / np.linalg.norm(bias)
        self.featurizer = HashedFeaturizer(
            spec.n_buckets,
            salt=spec.name,
            use_ngrams=spec.use_ngrams,
            idf=self.idf,
        )
        # Cell-level embedding sees one cell at a time with no corpus
        # context — TF-IDF weighting is a column-level operation in the
        # paper (Sec. 6.2.3), so the cell path uses a plain featurizer.
        self._cell_featurizer = HashedFeaturizer(
            spec.n_buckets, salt=spec.name, use_ngrams=spec.use_ngrams
        )

    @property
    def name(self) -> str:
        return self.spec.name

    def _project(self, X: np.ndarray) -> np.ndarray:
        E = X @ self.P
        norms = np.linalg.norm(E, axis=-1, keepdims=True)
        E = E / np.maximum(norms, 1e-12)
        E = E + self.bias
        if self.spec.normalize_output:
            E = E / np.maximum(np.linalg.norm(E, axis=-1, keepdims=True), 1e-12)
        return E

    def embed_token_lists(self, token_lists: list[list[str]]) -> np.ndarray:
        X = np.stack(
            [self.featurizer.vector_from_tokens(ts) for ts in token_lists]
        ) if token_lists else np.zeros((0, self.spec.n_buckets))
        return self._project(X)

    def embed_texts(self, texts: list[str]) -> np.ndarray:
        return self.embed_token_lists([tokenize(t) for t in texts])

    # ---- column embeddings (Table 1 variants) -------------------------

    def embed_column_cell_level(self, cells: list[str]) -> np.ndarray:
        """Cell-level variation: embed each cell alone (no corpus
        context, no idf), average the per-cell embeddings."""
        cells = [c for c in cells if c is not None and str(c).strip() != ""]
        if not cells:
            return self.bias.copy()
        X = np.stack([self._cell_featurizer.vector(str(c)) for c in cells])
        return self._project(X).mean(axis=0)

    def embed_column_column_level(
        self, cells: list[str], corpus_idf: IdfWeights
    ) -> np.ndarray:
        """Column-level variation: concatenate cells into one sequence,
        cap at the 512 highest-TF-IDF tokens (Sec. 6.2.3), embed once."""
        toks: list[str] = []
        for c in cells:
            if c is not None and str(c).strip() != "":
                toks.extend(tokenize(str(c)))
        toks = corpus_idf.top_tokens(toks, COLUMN_TOKEN_LIMIT)
        if not toks:
            return self.bias.copy()
        return self.embed_token_lists([toks])[0]

    def embed_table_columns(
        self,
        columns: list[list[str]],
        corpus_idf: IdfWeights,
        table_context: float = 0.0,
    ) -> np.ndarray:
        """Column-level embeddings for every column of one table.

        ``table_context`` > 0 blends each column with the table's mean
        column embedding (the Starmie mechanism): with alpha = 0.5 the
        columns of one table move measurably closer together.
        """
        E = np.stack(
            [self.embed_column_column_level(c, corpus_idf) for c in columns]
        )
        if table_context > 0 and len(columns) > 1:
            mean = E.mean(axis=0, keepdims=True)
            E = (1 - table_context) * E + table_context * mean
        return E


def make_model(name: str, idf: IdfWeights | None = None) -> EmbeddingModel:
    """Instantiate a zoo model by name (idf only used if the spec says so)."""
    try:
        return EmbeddingModel(_SPECS[name], idf)
    except KeyError:
        raise ValueError(f"unknown model {name!r}; one of {MODEL_NAMES}") from None
