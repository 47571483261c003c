"""Simulated GPT-3 baseline for diverse-tuple generation (Sec. 6.5.1).

The container is offline, so the LLM is simulated with the two
behaviours the paper measured and reasoned about:

1. **A few diverse tuples, then redundancy** — "for a given query, the
   LLM generates a few diverse tuples but subsequently, it produces
   redundant ones": the simulator emits genuinely novel on-topic tuples
   for a while, then recycles earlier generations with small value
   perturbations.
2. **Token limits** — prompting requires serializing the whole query
   table; the paper excludes the LLM on SANTOS because large query
   tables do not fit. The simulator enforces a context budget and
   raises :class:`LLMTokenLimitError` when the prompt exceeds it.

This substitution is documented in DESIGN.md §2.
"""
from __future__ import annotations

import numpy as np
import pandas as pd

from repro.core.serialize import serialize_table
from repro.lake.benchmark import LakeTable
from repro.lake.topics import pseudo_word
from repro.tokenize import tokenize


class LLMTokenLimitError(RuntimeError):
    """Prompt (query table + instructions) exceeds the context budget."""


# GPT-3-era context budget, in whitespace-ish tokens.
DEFAULT_TOKEN_LIMIT = 4096
# Fraction of k for which the simulated LLM keeps producing novel tuples
# before degenerating into near-duplicates of its own output.
NOVELTY_BUDGET = 0.5


def llm_generate_tuples(
    query: LakeTable,
    k: int,
    *,
    token_limit: int = DEFAULT_TOKEN_LIMIT,
    seed: int = 0,
) -> pd.DataFrame:
    """Generate k tuples 'unionable' with the query table.

    Raises LLMTokenLimitError when the serialized query table does not
    fit in the prompt budget (how the paper loses the LLM on SANTOS).
    """
    prompt_tokens = sum(len(tokenize(s)) for s in serialize_table(query.df))
    per_tuple = max(1, prompt_tokens // max(1, len(query.df)))
    if prompt_tokens + k * per_tuple > token_limit:
        raise LLMTokenLimitError(
            f"prompt needs ~{prompt_tokens + k * per_tuple} tokens > {token_limit}"
        )
    rng = np.random.default_rng(seed + 1717)
    headers = list(query.df.columns)
    # The model's "knowledge" of the topic: the query table's own value
    # distributions, which it remixes; novel phase invents new entities.
    generated: list[list[str]] = []
    n_novel = max(1, int(np.ceil(NOVELTY_BUDGET * k)))
    for i in range(k):
        if i < n_novel:
            row = []
            for h in headers:
                col_vals = query.df[h].astype(str).tolist()
                if rng.random() < 0.5:
                    # invent a new value (novel information)
                    row.append(pseudo_word(rng, 3))
                else:
                    row.append(str(rng.choice(col_vals)))
            generated.append(row)
        else:
            # Redundant phase: echo one of its own earlier tuples,
            # rewording a couple of cells — LLM "redundancy" is semantic
            # (near-duplicates in fresh words), not byte-identical
            # copies, so pairwise distances stay small but non-zero.
            src = list(generated[int(rng.integers(len(generated)))])
            n_cells = min(2, len(headers))
            for j in rng.choice(len(headers), size=n_cells, replace=False):
                src[int(j)] = pseudo_word(rng, 2)
            generated.append(src)
    return pd.DataFrame(generated, columns=headers)
