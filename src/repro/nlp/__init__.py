"""NLP substrate: tokenizer, trie NER (BertCRF substitute), semantic
embeddings (BERT substitute)."""
from repro.nlp.ner import build_trie, entity_sequences, extract_entities, match_entities
from repro.nlp.semantic import semantic_embeddings, top_k_similar
from repro.nlp.tokenizer import tokenize

__all__ = [
    "tokenize",
    "build_trie",
    "match_entities",
    "extract_entities",
    "entity_sequences",
    "semantic_embeddings",
    "top_k_similar",
]
