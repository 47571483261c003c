"""Benchmark generators: TUS-lite, TUS-Sampled-lite, SANTOS-lite,
UGEN-V1-lite, IMDB-lite.

Construction mirrors the originals (Sec. 6.1): each benchmark owns a set
of non-unionable base topics; query and data-lake tables are produced by
row selection and column projection of a base table, with header-synonym
renames and shuffled column order. Tables derived from the same base are
unionable; ground truth for unionability *and* column alignment falls
out of the construction. Lake tables deliberately re-use query rows
(``overlap``) to reproduce the ~90 % redundancy the paper motivates
with.

Sizes are scaled to a 16-core laptop-class box; paper-scale counts are
recorded next to ours in EXPERIMENTS.md (Fig 5).
"""
from __future__ import annotations

from dataclasses import dataclass, field

import numpy as np
import pandas as pd

from repro.lake.topics import Topic, generate_base_table, make_topic


@dataclass
class LakeTable:
    """A query or data-lake table plus its generation ground truth."""

    name: str
    df: pd.DataFrame
    base_id: int  # topic id (-1 if synthetic/unknown)
    col_map: dict[str, int]  # column name -> base column id
    row_ids: list[int] = field(default_factory=list)  # base row indices

    @property
    def n_rows(self) -> int:
        return len(self.df)

    @property
    def n_cols(self) -> int:
        return len(self.df.columns)


@dataclass
class Benchmark:
    name: str
    queries: list[LakeTable]
    lake: list[LakeTable]
    unionable: dict[str, list[str]]  # query name -> unionable lake table names

    def table(self, name: str) -> LakeTable:
        for t in self.queries + self.lake:
            if t.name == name:
                return t
        raise KeyError(name)

    def unionable_tables(self, query_name: str) -> list[LakeTable]:
        return [self.table(n) for n in self.unionable[query_name]]


def _derive_table(
    topic: Topic,
    base_df: pd.DataFrame,
    name: str,
    rng: np.random.Generator,
    *,
    n_rows: int,
    min_cols: int = 3,
    col_keep_prob: float = 0.8,
    prefer_rows: list[int] | None = None,
    overlap: float = 0.0,
    row_pool: list[int] | None = None,
) -> LakeTable:
    """Project + select a table out of a topic's base table.

    ``prefer_rows``/``overlap``: a fraction ``overlap`` of the rows is
    drawn from ``prefer_rows`` (typically the query's base rows) — this
    is the redundancy knob. ``row_pool`` restricts the non-preferred
    rows to a subset of the base (IMDB-lite uses this to make each lake
    table cover a narrow slice of the value space).
    """
    n_base = len(base_df)
    n_rows = min(n_rows, n_base)
    # --- rows -----------------------------------------------------------
    rows: list[int] = []
    if prefer_rows and overlap > 0:
        n_over = min(len(prefer_rows), int(round(overlap * n_rows)))
        rows.extend(rng.choice(prefer_rows, size=n_over, replace=False))
    remaining = n_rows - len(rows)
    if remaining > 0:
        pool = np.asarray(row_pool, dtype=np.int64) if row_pool is not None else np.arange(n_base)
        pool = np.setdiff1d(pool, np.asarray(rows, dtype=np.int64))
        rows.extend(rng.choice(pool, size=min(remaining, len(pool)), replace=False))
    rows = sorted(int(r) for r in rows)
    # --- columns --------------------------------------------------------
    keep = [c for c in topic.columns if rng.random() < col_keep_prob]
    if len(keep) < min(min_cols, len(topic.columns)):
        extra = [c for c in topic.columns if c not in keep]
        rng.shuffle(extra)
        keep.extend(extra[: min(min_cols, len(topic.columns)) - len(keep)])
    keep = list(keep)
    rng.shuffle(keep)
    data = {}
    col_map = {}
    for spec in keep:
        header = str(rng.choice(spec.headers))
        if header in data:  # two specs hashed to same variant text
            header = f"{header}_{spec.base_col_id}"
        data[header] = base_df[spec.canonical_header].iloc[rows].tolist()
        col_map[header] = spec.base_col_id
    return LakeTable(name, pd.DataFrame(data), topic.topic_id, col_map, rows)


def _build(
    bench_name: str,
    *,
    n_topics: int,
    queries_per_topic: int,
    lake_per_topic: int,
    base_rows: int,
    query_rows: tuple[int, int],
    lake_rows: tuple[int, int],
    n_columns: int,
    overlap: float,
    seed: int,
    negative_sibling_topics: bool = False,
) -> Benchmark:
    rng = np.random.default_rng(seed)
    queries: list[LakeTable] = []
    lake: list[LakeTable] = []
    unionable: dict[str, list[str]] = {}
    for tid in range(n_topics):
        topic = make_topic(
            tid, n_columns=n_columns, entity_pool_size=base_rows + 50, seed=seed
        )
        base = generate_base_table(topic, base_rows, seed=seed)
        topic_queries = []
        for qi in range(queries_per_topic):
            q = _derive_table(
                topic,
                base,
                f"{bench_name}_q{tid}_{qi}",
                rng,
                n_rows=int(rng.integers(query_rows[0], query_rows[1] + 1)),
                col_keep_prob=0.9,
            )
            topic_queries.append(q)
            queries.append(q)
            unionable[q.name] = []
        prefer = topic_queries[0].row_ids if topic_queries else None
        for li in range(lake_per_topic):
            t = _derive_table(
                topic,
                base,
                f"{bench_name}_t{tid}_{li}",
                rng,
                n_rows=int(rng.integers(lake_rows[0], lake_rows[1] + 1)),
                prefer_rows=prefer,
                overlap=overlap,
            )
            lake.append(t)
            for q in topic_queries:
                unionable[q.name].append(t.name)
        if negative_sibling_topics:
            # UGEN-V1-style hard negatives: same-subject vocabulary,
            # different (non-unionable) schema → a sibling topic sharing
            # category/text vocab.
            sibling = make_topic(
                10_000 + tid,
                n_columns=n_columns,
                entity_pool_size=base_rows + 50,
                seed=seed,
                vocab_overlap_with=topic,
            )
            sib_base = generate_base_table(sibling, base_rows, seed=seed)
            for ni in range(lake_per_topic):
                lake.append(
                    _derive_table(
                        sibling,
                        sib_base,
                        f"{bench_name}_n{tid}_{ni}",
                        rng,
                        n_rows=int(rng.integers(lake_rows[0], lake_rows[1] + 1)),
                    )
                )
    return Benchmark(bench_name, queries, lake, unionable)


# --------------------------------------------------------------------------
# Benchmark configurations (lite versions of Fig 5)
# --------------------------------------------------------------------------

def tus_lite(*, seed: int = 0, n_topics: int = 16, lake_per_topic: int = 10) -> Benchmark:
    """TUS-lite: many derived tables per base, medium row counts.

    Used to build the fine-tuning pair benchmark (like the paper's TUS
    fine-tuning benchmark) and for Fig 5 statistics. Sibling topics
    (shared vocabulary, different schema) are included so non-unionable
    pairs contain hard negatives — real Open Data base tables about
    related subjects do the same.
    """
    return _build(
        "tus",
        n_topics=n_topics,
        queries_per_topic=1,
        lake_per_topic=lake_per_topic,
        base_rows=300,
        query_rows=(40, 80),
        lake_rows=(40, 120),
        n_columns=9,
        overlap=0.5,
        seed=seed,
        negative_sibling_topics=True,
    )


def tus_sampled_lite(
    *, seed: int = 0, n_queries: int = 6, per_query: int = 10
) -> Benchmark:
    """TUS-Sampled-lite: a subsample of TUS-lite (Sec. 6.1.1)."""
    full = tus_lite(seed=seed)
    rng = np.random.default_rng(seed + 77)
    q_idx = rng.choice(len(full.queries), size=min(n_queries, len(full.queries)), replace=False)
    queries = [full.queries[int(i)] for i in sorted(q_idx)]
    unionable = {}
    keep_names: set[str] = set()
    for q in queries:
        names = full.unionable[q.name][:per_query]
        unionable[q.name] = names
        keep_names.update(names)
    lake = [t for t in full.lake if t.name in keep_names]
    return Benchmark("tus_sampled", queries, lake, unionable)


def santos_lite(
    *, seed: int = 0, n_topics: int = 10, lake_per_topic: int = 8
) -> Benchmark:
    """SANTOS-lite: fewer, larger unionable tables per query; heavy
    redundancy; thousands of unionable tuples per query (k=100 regime).

    Query tables are deliberately large relative to k: real SANTOS
    queries average ~21K tuples, so the Eq. 1 Average-Diversity metric
    is dominated by the query-tuple distance term. Keeping n >> k
    preserves that proportion at lite scale.
    """
    return _build(
        "santos",
        n_topics=n_topics,
        queries_per_topic=1,
        lake_per_topic=lake_per_topic,
        base_rows=900,
        query_rows=(350, 550),
        lake_rows=(100, 250),
        n_columns=10,
        overlap=0.6,
        seed=seed,
    )


def ugen_v1_lite(*, seed: int = 0, n_topics: int = 10) -> Benchmark:
    """UGEN-V1-lite: tiny tables (~10 rows), 10 unionable + 10 same-topic
    non-unionable tables per query (k=30 regime)."""
    return _build(
        "ugen_v1",
        n_topics=n_topics,
        queries_per_topic=1,
        lake_per_topic=10,
        base_rows=120,
        query_rows=(8, 14),
        lake_rows=(8, 14),
        n_columns=8,
        overlap=0.4,
        seed=seed,
        negative_sibling_topics=True,
    )


_IMDB_HEADERS = [
    "title", "director", "genre", "budget", "filming_locations", "languages",
    "year", "rating", "duration", "country", "production_company", "actor",
    "revenue",
]


def imdb_lite(*, seed: int = 0, n_tables: int = 20, rows_per_table: int = 97) -> Benchmark:
    """IMDB-lite case-study lake (Sec. 6.6): one movie base table of ~500
    rows; a 97-row query and 20 unionable tables sampled with overlap.

    Real movie tables cluster in value space (similar movies share
    genres, languages, locations), so each lake table draws its
    non-overlapping rows from a narrow *block* of the base table sorted
    by its category columns. Bag/set-union baselines that stop at the
    top-ranked (most query-similar) tables therefore cover few blocks,
    while DUST's diversification reaches across them — the Fig 8
    mechanism.
    """
    rng = np.random.default_rng(seed + 4242)
    topic = make_topic(555, n_columns=13, entity_pool_size=600, seed=seed)
    # Rename to the IMDB-like headers and give each column a kind that
    # matches its real-world semantics (genre/languages are
    # low-cardinality categories; budget/rating are numbers; ...).
    _IMDB_KINDS = [
        "entity", "person", "category", "number", "city", "category",
        "date", "number", "number", "country", "category", "person",
        "number",
    ]
    from repro.lake.topics import word_pool as _word_pool

    pool_rng = np.random.default_rng(seed + 999)
    for spec, header, kind in zip(topic.columns, _IMDB_HEADERS, _IMDB_KINDS):
        spec.headers = [header]
        spec.kind = kind
        if kind == "category" and spec.base_col_id not in topic.category_pools:
            topic.category_pools[spec.base_col_id] = _word_pool(
                pool_rng, 8, prefix=header[:3]
            )
    base = generate_base_table(topic, 500, seed=seed)
    query = _derive_table(
        topic, base, "imdb_q0", rng, n_rows=rows_per_table, col_keep_prob=1.01
    )
    # Order base rows by the category-ish columns -> contiguous blocks
    # hold similar movies.
    order = base.sort_values(["genre", "languages", "country"]).index.to_numpy()
    n_base = len(order)
    lake = []
    for i in range(n_tables):
        lo = int(i * n_base / n_tables)
        hi = min(n_base, lo + max(rows_per_table, n_base // n_tables))
        pool = [int(r) for r in order[lo:hi]]
        lake.append(
            _derive_table(
                topic,
                base,
                f"imdb_t{i}",
                rng,
                n_rows=rows_per_table,
                col_keep_prob=1.01,
                prefer_rows=query.row_ids,
                overlap=0.5,
                row_pool=pool,
            )
        )
    return Benchmark("imdb", [query], lake, {query.name: [t.name for t in lake]})


def benchmark_stats(bench: Benchmark) -> dict[str, float]:
    """The Fig 5 row for a benchmark."""
    q_tables = len(bench.queries)
    return {
        "benchmark": bench.name,
        "query_tables": q_tables,
        "query_columns": sum(t.n_cols for t in bench.queries),
        "query_tuples": sum(t.n_rows for t in bench.queries),
        "lake_tables": len(bench.lake),
        "lake_columns": sum(t.n_cols for t in bench.lake),
        "lake_tuples": sum(t.n_rows for t in bench.lake),
        "avg_unionable_per_query": (
            sum(len(v) for v in bench.unionable.values()) / max(1, q_tables)
        ),
    }
