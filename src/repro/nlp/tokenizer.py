"""Whitespace tokenizer shared by the NER tagger and the semantic embedder."""
from __future__ import annotations


def tokenize(text: str) -> list[str]:
    """Lower-cased whitespace tokens (the synthetic corpus is space-joined)."""
    return text.lower().split()
