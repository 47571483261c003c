"""Tokenizer, char n-grams, stable hashing and IDF weights."""
import math

import pytest
from hypothesis import given, settings
from hypothesis import strategies as st

from repro.tokenize import (
    IdfWeights,
    char_ngrams,
    hash_bucket,
    stable_hash,
    tokenize,
)


class TestTokenize:
    def test_basic_words(self):
        assert tokenize("Park Name") == ["park", "name"]

    def test_lowercases(self):
        assert tokenize("USA") == ["usa"]

    def test_punctuation_split(self):
        assert tokenize("a,b;c") == ["a", "b", "c"]

    def test_keeps_numbers(self):
        assert tokenize("773 731-0380") == ["773", "731-0380"]

    def test_keeps_underscore_and_hash(self):
        assert tokenize("Brand#13 park_city") == ["brand#13", "park_city"]

    def test_none_is_empty(self):
        assert tokenize(None) == []

    def test_empty_string(self):
        assert tokenize("") == []

    def test_non_string_coerced(self):
        assert tokenize(123.5) == ["123.5"]

    def test_order_preserved(self):
        assert tokenize("b a c a") == ["b", "a", "c", "a"]


class TestCharNgrams:
    def test_short_token(self):
        # "<ab>" has length 4: 3-grams and 4-grams only.
        grams = char_ngrams("ab")
        assert "<ab" in grams and "ab>" in grams and "<ab>" in grams

    def test_boundary_markers(self):
        grams = char_ngrams("park")
        assert "<pa" in grams
        assert "rk>" in grams

    def test_too_short_empty_for_some_n(self):
        assert char_ngrams("a", 3, 5) == ["<a>"]

    def test_count(self):
        s = "<hello>"  # len 7
        grams = char_ngrams("hello")
        expected = sum(len(s) - n + 1 for n in (3, 4, 5))
        assert len(grams) == expected


class TestStableHash:
    def test_deterministic(self):
        assert stable_hash("abc") == stable_hash("abc")

    def test_salt_changes_hash(self):
        assert stable_hash("abc", "x") != stable_hash("abc", "y")

    def test_bucket_in_range(self):
        for t in ("a", "bb", "ccc"):
            assert 0 <= hash_bucket(t, 17) < 17

    @given(st.text(min_size=1, max_size=20), st.integers(2, 4096))
    @settings(max_examples=50, deadline=None)
    def test_bucket_always_in_range(self, token, n):
        assert 0 <= hash_bucket(token, n) < n


class TestIdfWeights:
    def test_rare_tokens_weigh_more(self):
        docs = [["common", "rare1"], ["common"], ["common"], ["common", "rare2"]]
        idf = IdfWeights(docs)
        assert idf("rare1") > idf("common")

    def test_unknown_token_gets_max(self):
        idf = IdfWeights([["a"], ["a", "b"]])
        assert idf("zzz") >= idf("b") >= idf("a")

    def test_formula(self):
        idf = IdfWeights([["a"], ["b"]])
        assert idf("a") == pytest.approx(math.log(3 / 2) + 1.0)

    def test_duplicate_tokens_in_doc_count_once(self):
        idf1 = IdfWeights([["a", "a", "a"], ["b"]])
        idf2 = IdfWeights([["a"], ["b"]])
        assert idf1("a") == pytest.approx(idf2("a"))

    def test_empty_corpus(self):
        idf = IdfWeights([])
        assert idf("anything") > 0

    def test_top_tokens_respects_limit(self):
        idf = IdfWeights([["a"], ["b"], ["c"]])
        toks = ["a"] * 5 + ["b"] * 3 + ["c"]
        out = idf.top_tokens(toks, 4)
        assert len(out) == 4

    def test_top_tokens_no_truncation_needed(self):
        idf = IdfWeights([["a"]])
        assert idf.top_tokens(["a", "b"], 10) == ["a", "b"]

    def test_top_tokens_prefers_high_tfidf(self):
        idf = IdfWeights([["common"]] * 10 + [["rare"]])
        toks = ["common"] * 3 + ["rare"] * 3
        out = idf.top_tokens(toks, 3)
        assert "rare" in out
