"""The seven schema matching methods of the paper (§VI), adapted to
output **ranked** lists of column pairs as dataset discovery requires.

Registry (paper Table I):

=====================  =======================================  ==========
method                 class                                    kind
=====================  =======================================  ==========
Cupid                  CupidMatcher                             schema
Similarity Flooding    SimilarityFloodingMatcher                schema
COMA (schema)          ComaMatcher(strategy="schema")           schema
COMA (instance)        ComaMatcher(strategy="instance")         instance
Distribution-based     DistributionBasedMatcher                 instance
Jaccard-Levenshtein    JaccardLevenshteinMatcher                instance
SemProp                SemPropMatcher                           hybrid
EmbDI                  EmbDIMatcher                             hybrid
=====================  =======================================  ==========
"""
from repro.matchers.base import Matcher, all_column_pairs, as_match_df
from repro.matchers.jaccard_levenshtein import JaccardLevenshteinMatcher
from repro.matchers.coma import ComaMatcher
from repro.matchers.cupid import CupidMatcher
from repro.matchers.similarity_flooding import SimilarityFloodingMatcher
from repro.matchers.distribution_based import DistributionBasedMatcher
from repro.matchers.semprop import SemPropMatcher
from repro.matchers.embdi import EmbDIMatcher

__all__ = [
    "Matcher",
    "all_column_pairs",
    "as_match_df",
    "JaccardLevenshteinMatcher",
    "ComaMatcher",
    "CupidMatcher",
    "SimilarityFloodingMatcher",
    "DistributionBasedMatcher",
    "SemPropMatcher",
    "EmbDIMatcher",
]
