"""Name lexicon: tokenization, abbreviation expansion, synonymy.

This package is the reproduction's substitute for WordNet (used by
Cupid's linguistic matcher) and COMA's synonym tables. See DESIGN.md §5.
"""
from repro.lexicon.tokenize import tokenize, normalize_token, drop_vowels
from repro.lexicon.thesaurus import (
    ABBREVIATIONS,
    SYNONYM_SETS,
    are_synonyms,
    expand_token,
    name_similarity,
    token_similarity,
)

__all__ = [
    "tokenize",
    "normalize_token",
    "drop_vowels",
    "ABBREVIATIONS",
    "SYNONYM_SETS",
    "are_synonyms",
    "expand_token",
    "name_similarity",
    "token_similarity",
]
