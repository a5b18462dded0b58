"""Synonym thesaurus + abbreviation dictionary (WordNet substitute).

Cupid uses WordNet to score token synonymy; COMA ships synonym tables.
Neither resource is available offline, so this module provides a
hand-built lexicon covering the vocabulary of the reproduction's
datasets (DESIGN.md §5). Coverage over the evaluated vocabulary — not
breadth — is what the matchers need: a synonym hit scores 1.0, exactly
as a WordNet synset hit would.
"""
from __future__ import annotations

from functools import lru_cache

from repro.lexicon.tokenize import drop_vowels, tokenize

#: Synonym groups. Tokens within a set are pairwise synonymous.
SYNONYM_SETS: tuple[frozenset[str], ...] = (
    frozenset({"client", "customer", "cust", "buyer", "prospect"}),
    frozenset({"phone", "telephone", "tel", "mobile", "cell"}),
    frozenset({"spouse", "partner", "husband", "wife"}),
    frozenset({"id", "identifier", "key", "code"}),
    frozenset({"name", "title", "label"}),
    frozenset({"address", "addr", "location", "residence"}),
    frozenset({"city", "town", "municipality"}),
    frozenset({"country", "cntr", "nation", "state"}),
    frozenset({"income", "salary", "earnings", "wage"}),
    frozenset({"birth", "born", "dob"}),
    frozenset({"genre", "style", "category", "type", "kind"}),
    frozenset({"song", "track", "single", "recording"}),
    frozenset({"company", "employer", "firm", "organisation", "organization", "org"}),
    frozenset({"team", "squad", "group", "crew"}),
    frozenset({"owner", "holder", "responsible"}),
    frozenset({"task", "item", "story", "ticket"}),
    frozenset({"sprint", "iteration", "cycle"}),
    frozenset({"application", "app", "software", "system"}),
    frozenset({"manager", "lead", "head", "supervisor"}),
    frozenset({"department", "dept", "division", "unit"}),
    frozenset({"hardware", "server", "machine", "host"}),
    frozenset({"date", "day", "time", "timestamp"}),
    frozenset({"start", "begin", "from"}),
    frozenset({"end", "finish", "until", "to"}),
    frozenset({"amount", "amt", "total", "sum", "value"}),
    frozenset({"number", "num", "count", "cnt", "qty", "quantity"}),
    frozenset({"description", "desc", "comment", "notes", "remarks"}),
    frozenset({"status", "state", "stage", "phase"}),
    frozenset({"priority", "rank", "severity"}),
    frozenset({"assay", "test", "experiment"}),
    frozenset({"organism", "species"}),
    frozenset({"tissue", "organ"}),
    frozenset({"cell", "cellline"}),
    frozenset({"target", "goal", "objective"}),
    frozenset({"score", "rating", "grade", "confidence"}),
    frozenset({"gender", "sex"}),
    frozenset({"marital", "marriage"}),
    frozenset({"net", "netto"}),
    frozenset({"worth", "wealth", "assets"}),
    frozenset({"postal", "zip", "postcode"}),
    frozenset({"epic", "theme", "initiative"}),
    frozenset({"artist", "singer", "musician", "performer"}),
    frozenset({"album", "record", "release"}),
    frozenset({"instrument", "plays"}),
    frozenset({"citizenship", "nationality"}),
    frozenset({"occupation", "profession", "job", "role"}),
)

#: Common column-name abbreviations -> full word. Used both to *expand*
#: abbreviated tokens when matching and by the fabricator's
#: "abbreviate" schema-noise rule (repro.fabrication.noise).
ABBREVIATIONS: dict[str, str] = {
    "cust": "customer", "addr": "address", "num": "number", "no": "number",
    "qty": "quantity", "amt": "amount", "desc": "description",
    "dept": "department", "tel": "telephone", "org": "organization",
    "mgr": "manager", "cat": "category", "cntr": "country", "ctry": "country",
    "dob": "birth", "fname": "firstname", "lname": "lastname",
    "app": "application", "emp": "employer", "acct": "account",
    "bal": "balance", "ref": "reference", "std": "standard",
    "avg": "average", "min": "minimum", "max": "maximum", "pct": "percent",
    "yr": "year", "mo": "month", "wk": "week", "hr": "hour",
    "st": "street", "apt": "apartment", "zip": "postal",
}

_token_to_set: dict[str, int] = {}
for _i, _s in enumerate(SYNONYM_SETS):
    for _t in _s:
        # A token may appear in several sets; membership is checked per set.
        _token_to_set.setdefault(_t, _i)


def expand_token(tok: str) -> str:
    """Expand a known abbreviation, else return the token unchanged."""
    return ABBREVIATIONS.get(tok, tok)


def are_synonyms(a: str, b: str) -> bool:
    """True when tokens share a synonym set (after abbreviation expansion)."""
    a, b = expand_token(a.lower()), expand_token(b.lower())
    if a == b:
        return True
    for s in SYNONYM_SETS:
        if a in s and b in s:
            return True
    return False


def _lev(a: str, b: str) -> int:
    """Plain Levenshtein distance (iterative two-row DP)."""
    if a == b:
        return 0
    if not a:
        return len(b)
    if not b:
        return len(a)
    prev = list(range(len(b) + 1))
    for i, ca in enumerate(a, 1):
        cur = [i]
        for j, cb in enumerate(b, 1):
            cur.append(min(prev[j] + 1, cur[j - 1] + 1, prev[j - 1] + (ca != cb)))
        prev = cur
    return prev[-1]


def levenshtein_ratio(a: str, b: str) -> float:
    """``1 - lev(a,b)/max(len)`` in [0, 1]; 1.0 for two empty strings."""
    if not a and not b:
        return 1.0
    return 1.0 - _lev(a, b) / max(len(a), len(b))


@lru_cache(maxsize=65536)
def token_similarity(a: str, b: str) -> float:
    """Similarity of two name tokens in [0, 1].

    1.0 for equality/synonymy (thesaurus hit, as WordNet would give);
    partial credit for an abbreviation/prefix relationship (0.75) or a
    vowel-dropped variant (0.8) — recoverable but uncertain, mirroring
    how real matchers only partially undo the fabricator's noise rules;
    otherwise the Levenshtein ratio.
    """
    a, b = a.lower(), b.lower()
    if a == b or are_synonyms(a, b):
        return 1.0
    ea, eb = expand_token(a), expand_token(b)
    if ea == eb or are_synonyms(ea, eb):
        return 1.0
    short, long_ = (ea, eb) if len(ea) <= len(eb) else (eb, ea)
    if len(short) >= 3 and long_.startswith(short):
        return 0.75
    if drop_vowels(long_) == short or drop_vowels(ea) == drop_vowels(eb):
        return 0.8
    return levenshtein_ratio(ea, eb)


def name_similarity(a: str, b: str) -> float:
    """Similarity of two (multi-token) element names in [0, 1].

    Symmetric soft token alignment: each token is matched to its best
    counterpart; the two directional averages are averaged. This is the
    linguistic-similarity core shared by Cupid and COMA's Name matcher.
    """
    ta, tb = tokenize(a), tokenize(b)
    if not ta or not tb:
        return 1.0 if normalize(a) == normalize(b) else 0.0
    fwd = sum(max(token_similarity(x, y) for y in tb) for x in ta) / len(ta)
    bwd = sum(max(token_similarity(x, y) for y in ta) for x in tb) / len(tb)
    return (fwd + bwd) / 2.0


def normalize(name: str) -> str:
    """Canonical join-key form of a name: lowercase alnum only."""
    return "".join(ch for ch in name.lower() if ch.isalnum())
