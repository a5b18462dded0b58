"""Unit tests for the name lexicon (tokenizer + thesaurus)."""
import pytest
from hypothesis import given, settings
from hypothesis import strategies as st

from repro.lexicon.thesaurus import (
    are_synonyms,
    expand_token,
    levenshtein_ratio,
    name_similarity,
    normalize,
    token_similarity,
)
from repro.lexicon.tokenize import drop_vowels, tokenize


class TestTokenize:
    @pytest.mark.parametrize("name,expected", [
        ("cust_id", ["cust", "id"]),
        ("custAddrLine1", ["cust", "addr", "line", "1"]),
        ("CUSTOMER", ["customer"]),
        ("first-name", ["first", "name"]),
        ("a1b2", ["a", "1", "b", "2"]),
        ("", []),
        ("___", []),
        ("snake_case_name", ["snake", "case", "name"]),
        ("HTMLParser", ["htmlparser"]),  # all-caps runs stay together
    ])
    def test_tokenize(self, name, expected):
        assert tokenize(name) == expected

    @given(st.text(max_size=40))
    @settings(max_examples=50)
    def test_tokens_are_lowercase_alnum(self, s):
        for t in tokenize(s):
            assert t == t.lower()
            assert t.isalnum()


class TestDropVowels:
    @pytest.mark.parametrize("name,expected", [
        ("customer", "cstmr"),
        ("owner_team", "ownr_tm"),
        ("id", "id"),
        ("aeiou", "a"),
        ("", ""),
    ])
    def test_drop_vowels(self, name, expected):
        assert drop_vowels(name) == expected

    def test_keeps_leading_vowel(self):
        assert drop_vowels("address")[0] == "a"


class TestSynonyms:
    @pytest.mark.parametrize("a,b", [
        ("client", "customer"), ("phone", "telephone"), ("spouse", "partner"),
        ("team", "squad"), ("cust", "client"),  # via abbreviation expansion
        ("genre", "style"), ("income", "salary"),
    ])
    def test_synonym_pairs(self, a, b):
        assert are_synonyms(a, b)
        assert are_synonyms(b, a)  # symmetric

    @pytest.mark.parametrize("a,b", [
        ("client", "phone"), ("team", "genre"), ("xyz", "abc"),
    ])
    def test_non_synonyms(self, a, b):
        assert not are_synonyms(a, b)

    def test_identity(self):
        assert are_synonyms("anything", "anything")

    def test_expand_token(self):
        assert expand_token("cust") == "customer"
        assert expand_token("addr") == "address"
        assert expand_token("unknown") == "unknown"


class TestLevenshteinRatio:
    @pytest.mark.parametrize("a,b,expected", [
        ("abc", "abc", 1.0),
        ("abc", "abd", 2 / 3),
        ("", "", 1.0),
        ("", "abc", 0.0),
        ("kitten", "sitting", 1 - 3 / 7),
    ])
    def test_values(self, a, b, expected):
        assert levenshtein_ratio(a, b) == pytest.approx(expected)

    @given(st.text(max_size=15), st.text(max_size=15))
    @settings(max_examples=50)
    def test_bounds_and_symmetry(self, a, b):
        r = levenshtein_ratio(a, b)
        assert 0.0 <= r <= 1.0
        assert r == pytest.approx(levenshtein_ratio(b, a))


class TestTokenSimilarity:
    def test_equal_and_synonym_are_one(self):
        assert token_similarity("name", "name") == 1.0
        assert token_similarity("client", "customer") == 1.0

    def test_abbreviation_prefix_credit(self):
        assert token_similarity("desc", "description") == 1.0  # lexicon hit
        assert token_similarity("vel", "velocity") == 0.75     # plain prefix

    def test_vowel_drop_credit(self):
        assert token_similarity("cstmr", "customer") == 0.8

    def test_unrelated_low(self):
        assert token_similarity("xqz", "banana") < 0.4


class TestNameSimilarity:
    def test_identical(self):
        assert name_similarity("cust_id", "cust_id") == 1.0

    def test_synonym_tokens(self):
        assert name_similarity("client_name", "customer_name") == 1.0

    def test_renamed_column_recoverable(self):
        # the fabricator's prefix rule keeps the original tokens present
        assert name_similarity("city", "clients_t_city") > 0.55

    def test_unrelated_names_low(self):
        assert name_similarity("phone", "income") < 0.5

    def test_symmetry(self):
        a, b = "owner_team_name", "squad_id"
        assert name_similarity(a, b) == pytest.approx(name_similarity(b, a))

    def test_empty_name(self):
        assert name_similarity("", "") == 1.0
        assert name_similarity("", "abc") == 0.0

    def test_normalize(self):
        assert normalize("Cust_ID 1") == "custid1"
