"""Entity representation: serialization + deterministic text encoder.

Stand-in for the paper's frozen Sentence-BERT ``all-MiniLM-L12-v2``
(offline substitution — see DESIGN.md §2): hashed character-3-gram bags with
linguistic token weighting, randomly projected to a unit-norm dense vector.
"""
from repro.embedding.serialize import serialize_col, with_text
from repro.embedding.encoder import (
    EMB_DIM,
    encode_texts,
    with_embeddings,
    token_weight,
)

__all__ = [
    "serialize_col",
    "with_text",
    "EMB_DIM",
    "encode_texts",
    "with_embeddings",
    "token_weight",
]
