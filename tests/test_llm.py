"""Simulated LLM baseline."""
import numpy as np
import pandas as pd
import pytest

from repro.sim.llm import (
    DEFAULT_TOKEN_LIMIT,
    LLMTokenLimitError,
    llm_generate_tuples,
)


class TestLLM:
    def test_generates_k_with_query_schema(self, tiny_ugen):
        q = tiny_ugen.queries[0]
        out = llm_generate_tuples(q, 10)
        assert len(out) == 10
        assert list(out.columns) == list(q.df.columns)

    def test_deterministic(self, tiny_ugen):
        q = tiny_ugen.queries[0]
        a = llm_generate_tuples(q, 8, seed=1)
        b = llm_generate_tuples(q, 8, seed=1)
        assert a.equals(b)

    def test_large_query_exceeds_token_limit(self, tiny_santos):
        q = tiny_santos.queries[0]  # ~hundreds of rows -> prompt too big
        with pytest.raises(LLMTokenLimitError):
            llm_generate_tuples(q, 100)

    def test_small_limit_raises(self, tiny_ugen):
        q = tiny_ugen.queries[0]
        with pytest.raises(LLMTokenLimitError):
            llm_generate_tuples(q, 5, token_limit=10)

    def test_redundancy_in_later_tuples(self, tiny_ugen):
        """The paper's observation: a few diverse tuples, then redundant
        ones — later generations duplicate earlier ones heavily."""
        q = tiny_ugen.queries[0]
        out = llm_generate_tuples(q, 30, seed=0)
        # The tail recycles earlier rows with one reworded cell: count
        # near-duplicate pairs (rows agreeing on all but <=1 column).
        def near_dupes(df):
            rows = df.to_numpy()
            n = 0
            for i in range(len(rows)):
                for j in range(i + 1, len(rows)):
                    if (rows[i] != rows[j]).sum() <= 2:
                        n += 1
            return n

        assert near_dupes(out.tail(15)) > near_dupes(out.head(15))

    def test_novel_phase_adds_new_values(self, tiny_ugen):
        q = tiny_ugen.queries[0]
        out = llm_generate_tuples(q, 10, seed=0)
        col = q.df.columns[0]
        have = set(q.df[col].astype(str))
        new = set(out[col].astype(str)) - have
        assert new
