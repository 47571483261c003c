"""Holistic column alignment + ground truth + bipartite baseline."""
import numpy as np
import pytest

from repro.core.align import (
    Alignment,
    alignment_ground_truth,
    bipartite_alignment,
    corpus_idf,
    holistic_alignment,
)
from repro.core.metrics import alignment_prf


@pytest.fixture(scope="module")
def setup(tiny_santos):
    bench = tiny_santos
    q = bench.queries[0]
    tables = bench.unionable_tables(q.name) + [
        t for t in bench.lake if t.base_id != q.base_id
    ][:1]
    return bench, q, tables


class TestGroundTruth:
    def test_query_columns_map_to_themselves(self, setup):
        _, q, tables = setup
        _, true_map = alignment_ground_truth(q, tables)
        for c in q.df.columns:
            assert true_map[(q.name, c)] == c

    def test_unionable_columns_mapped_by_base_col(self, setup):
        _, q, tables = setup
        _, true_map = alignment_ground_truth(q, tables)
        q_by_base = {b: c for c, b in q.col_map.items()}
        for t in tables:
            if t.base_id != q.base_id:
                continue
            for c, b in t.col_map.items():
                if b in q_by_base:
                    assert true_map[(t.name, c)] == q_by_base[b]

    def test_non_unionable_columns_absent(self, setup):
        _, q, tables = setup
        _, true_map = alignment_ground_truth(q, tables)
        for t in tables:
            if t.base_id != q.base_id:
                for c in t.df.columns:
                    assert (t.name, c) not in true_map

    def test_singletons_for_unmatched_query_columns(self, tiny_santos):
        q = tiny_santos.queries[0]
        gt, _ = alignment_ground_truth(q, [])  # no data-lake tables at all
        assert all(p[0] == "single" for p in gt)
        assert len(gt) == q.n_cols


class TestHolistic:
    def test_high_f1_on_unionable_tables(self, setup):
        _, q, tables = setup
        al = holistic_alignment(q, tables)
        gt, _ = alignment_ground_truth(q, tables)
        m = alignment_prf(gt, al.aligned_pairs(q.name))
        assert m["f1"] > 0.6

    def test_every_kept_cluster_has_one_query_column(self, setup):
        _, q, tables = setup
        al = holistic_alignment(q, tables)
        by_q = {}
        for (tname, col), qcol in al.mapping.items():
            by_q.setdefault(qcol, []).append((tname, col))
        for qcol, members in by_q.items():
            qcols = [m for m in members if m[0] == q.name]
            assert qcols == [(q.name, qcol)]

    def test_at_most_one_column_per_table_per_cluster(self, setup):
        _, q, tables = setup
        al = holistic_alignment(q, tables)
        by_q = {}
        for (tname, col), qcol in al.mapping.items():
            by_q.setdefault(qcol, []).append(tname)
        for members in by_q.values():
            assert len(members) == len(set(members))

    def test_cell_level_variant_runs(self, setup):
        _, q, tables = setup
        al = holistic_alignment(q, tables[:2], level="cell")
        assert al.mapping

    def test_silhouette_recorded(self, setup):
        _, q, tables = setup
        al = holistic_alignment(q, tables)
        assert -1.0 <= al.silhouette <= 1.0
        assert al.n_clusters >= 2

    def test_strong_table_context_degrades_alignment(self, setup):
        """The Table 1 mechanism: blending columns toward their table's
        mean makes them indistinguishable. At context ~1.0 every column
        of a table collapses to the same point, so alignment quality
        must drop sharply relative to no context. (The aggregate
        roberta-vs-starmie ordering is measured by the Table 1 harness
        and recorded in EXPERIMENTS.md, not asserted per instance.)"""
        _, q, tables = setup
        gt, _ = alignment_ground_truth(q, tables)
        f1_none = alignment_prf(
            gt,
            holistic_alignment(q, tables, model_name="starmie").aligned_pairs(q.name),
        )["f1"]
        f1_full = alignment_prf(
            gt,
            holistic_alignment(
                q, tables, model_name="starmie", table_context=0.95
            ).aligned_pairs(q.name),
        )["f1"]
        assert f1_full < f1_none


class TestBipartite:
    def test_runs_and_maps_columns(self, setup):
        _, q, tables = setup
        al = bipartite_alignment(q, tables)
        assert all(qc in q.df.columns for qc in al.mapping.values())

    def test_per_table_at_most_one_per_query_column(self, setup):
        _, q, tables = setup
        al = bipartite_alignment(q, tables)
        for t in tables:
            targets = [
                qc for (tn, _), qc in al.mapping.items() if tn == t.name
            ]
            assert len(targets) == len(set(targets))


class TestAlignedPairs:
    def test_pair_set_contents(self):
        al = Alignment(
            mapping={
                ("Q", "c1"): "c1",
                ("T", "x"): "c1",
                ("Q", "c2"): "c2",
            }
        )
        pairs = al.aligned_pairs("Q")
        assert frozenset((("Q", "c1"), ("T", "x"))) in pairs
        assert ("single", ("Q", "c2")) in pairs

    def test_two_lake_columns_pair_together(self):
        al = Alignment(
            mapping={
                ("Q", "c"): "c",
                ("T1", "x"): "c",
                ("T2", "y"): "c",
            }
        )
        pairs = al.aligned_pairs("Q")
        assert frozenset((("T1", "x"), ("T2", "y"))) in pairs
        assert len([p for p in pairs if isinstance(p, frozenset)]) == 3
