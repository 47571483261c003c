"""Holistic column alignment (Sec. 3.3, Appendix A.1.1).

Embeds every column of the query and its unionable tables, clusters them
with constrained agglomerative clustering (columns of one table never
co-cluster), picks the cut maximizing the mean Silhouette coefficient,
and discards clusters containing no query column. Because of the
constraint, a kept cluster holds exactly one query column; its members
are the data-lake columns aligned to it.

Also implements the ``Starmie (B)`` baseline: per-table maximum-weight
bipartite matching against the query columns (Table 1).
"""
from __future__ import annotations

from dataclasses import dataclass, field

import numpy as np

from repro.cluster import agglomerative, max_weight_matching
from repro.cluster.distance import cosine_distance_matrix, distance_matrix
from repro.cluster.silhouette import best_cut
from repro.embed.models import EmbeddingModel, make_model
from repro.tokenize import IdfWeights, tokenize

ColumnRef = tuple[str, str]  # (table name, column name)


@dataclass
class Alignment:
    """mapping: (table, column) -> query column it aligns to; query
    columns map to themselves. ``clusters`` keeps the full pre-discard
    clustering for inspection/metrics."""

    mapping: dict[ColumnRef, str]
    clusters: list[list[ColumnRef]] = field(default_factory=list)
    n_clusters: int = 0
    silhouette: float = float("nan")

    def aligned_pairs(self, query_name: str) -> set:
        """The A_M set of Sec. 6.2.2: unordered pairs within each kept
        cluster + singleton markers for unmatched query columns."""
        by_query: dict[str, list[ColumnRef]] = {}
        for ref, qcol in self.mapping.items():
            by_query.setdefault(qcol, []).append(ref)
        pairs: set = set()
        for members in by_query.values():
            if len(members) == 1 and members[0][0] == query_name:
                pairs.add(("single", members[0]))
                continue
            for i in range(len(members)):
                for j in range(i + 1, len(members)):
                    pairs.add(frozenset((members[i], members[j])))
        return pairs


def _column_values(df, col) -> list[str]:
    return [str(v) for v in df[col].tolist()]


def corpus_idf(tables) -> IdfWeights:
    """IDF fitted over all columns of all given tables (one column = one
    document), shared by every embedding variant of a benchmark run."""
    def docs():
        for t in tables:
            for c in t.df.columns:
                toks = []
                for v in _column_values(t.df, c):
                    toks.extend(tokenize(v))
                yield toks
    return IdfWeights(docs())


def embed_columns(
    tables,
    model: EmbeddingModel,
    idf: IdfWeights,
    *,
    level: str = "column",
    table_context: float = 0.0,
) -> tuple[list[ColumnRef], np.ndarray, np.ndarray]:
    """Embed every column of every table.

    Returns (refs, embeddings, group ids) where group ids mark the
    source table (the cannot-link constraint for clustering).
    """
    refs: list[ColumnRef] = []
    groups: list[int] = []
    chunks: list[np.ndarray] = []
    for gid, t in enumerate(tables):
        cols = list(t.df.columns)
        refs.extend((t.name, c) for c in cols)
        groups.extend([gid] * len(cols))
        if level == "column":
            E = model.embed_table_columns(
                [_column_values(t.df, c) for c in cols],
                idf,
                table_context=table_context,
            )
        elif level == "cell":
            E = np.stack(
                [model.embed_column_cell_level(_column_values(t.df, c)) for c in cols]
            )
        else:
            raise ValueError(f"unknown level {level!r}")
        chunks.append(E)
    return refs, np.vstack(chunks), np.asarray(groups, dtype=np.int64)


def holistic_alignment(
    query,
    tables,
    *,
    model_name: str = "roberta",
    level: str = "column",
    metric: str = "euclidean",
    table_context: float = 0.0,
    idf: IdfWeights | None = None,
) -> Alignment:
    """DUST's holistic matcher: constrained clustering + silhouette cut.

    The paper's chosen configuration is column-level RoBERTa with average
    linkage and Euclidean distance (Sec. 6.2) — the defaults here.
    """
    all_tables = [query] + list(tables)
    if idf is None:
        idf = corpus_idf(all_tables)
    model = make_model(model_name, idf)
    refs, E, groups = embed_columns(
        all_tables, model, idf, level=level, table_context=table_context
    )
    D = distance_matrix(E, metric)
    dend = agglomerative(D, cannot_link_groups=groups)
    k, labels, score = best_cut(D, dend)
    clusters: list[list[ColumnRef]] = [[] for _ in range(int(labels.max()) + 1)]
    for ref, lab in zip(refs, labels):
        clusters[int(lab)].append(ref)
    mapping: dict[ColumnRef, str] = {}
    for members in clusters:
        qcols = [c for t, c in members if t == query.name]
        if not qcols:
            continue  # discard clusters without a query column (Sec. 3.3)
        qcol = qcols[0]
        for ref in members:
            mapping[ref] = qcol
    return Alignment(mapping, clusters, k, score)


def bipartite_alignment(
    query,
    tables,
    *,
    model_name: str = "starmie",
    table_context: float = 0.5,
    idf: IdfWeights | None = None,
) -> Alignment:
    """Starmie (B): per-table max-weight bipartite matching of column
    embeddings against the query's columns (cosine similarity weights)."""
    all_tables = [query] + list(tables)
    if idf is None:
        idf = corpus_idf(all_tables)
    model = make_model(model_name, idf)
    q_cols = list(query.df.columns)
    Eq = model.embed_table_columns(
        [_column_values(query.df, c) for c in q_cols], idf, table_context=table_context
    )
    mapping: dict[ColumnRef, str] = {(query.name, c): c for c in q_cols}
    for t in tables:
        t_cols = list(t.df.columns)
        Et = model.embed_table_columns(
            [_column_values(t.df, c) for c in t_cols], idf, table_context=table_context
        )
        sim = 1.0 - cosine_distance_matrix(Eq, Et)
        for qi, ti in max_weight_matching(sim):
            mapping[(t.name, t_cols[ti])] = q_cols[qi]
    return Alignment(mapping)


def alignment_ground_truth(query, tables) -> tuple[set, dict[ColumnRef, str]]:
    """The A_G set of Sec. 6.2.2 plus the true (table, col) -> query-col
    map, derived from the benchmark's generation ground truth."""
    true_map: dict[ColumnRef, str] = {}
    qcol_by_base: dict[int, str] = {}
    for c, bid in query.col_map.items():
        qcol_by_base[bid] = c
        true_map[(query.name, c)] = c
    for t in tables:
        if t.base_id != query.base_id:
            continue  # non-unionable: no columns align
        for c, bid in t.col_map.items():
            if bid in qcol_by_base:
                true_map[(t.name, c)] = qcol_by_base[bid]
    by_query: dict[str, list[ColumnRef]] = {}
    for ref, qcol in true_map.items():
        by_query.setdefault(qcol, []).append(ref)
    pairs: set = set()
    for qcol, members in by_query.items():
        if len(members) == 1:
            pairs.add(("single", members[0]))
            continue
        for i in range(len(members)):
            for j in range(i + 1, len(members)):
                pairs.add(frozenset((members[i], members[j])))
    return pairs, true_map
