"""Embedding model zoo + fine-tuning substrate.

Stand-ins for the paper's pre-trained language models and the DUST
fine-tuned tuple encoder (see DESIGN.md §2 for the substitution
rationale). Every model is a deterministic function of its name (seeded
random projection over hashed token features), so experiments are fully
reproducible without network or GPUs.
"""
from repro.embed.features import HashedFeaturizer
from repro.embed.models import EmbeddingModel, make_model, MODEL_NAMES
from repro.embed.finetune import FineTunedModel, train_finetuned

__all__ = [
    "HashedFeaturizer",
    "EmbeddingModel",
    "make_model",
    "MODEL_NAMES",
    "FineTunedModel",
    "train_finetuned",
]
