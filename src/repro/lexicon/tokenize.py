"""Column-name tokenization.

Schema matchers (Cupid, COMA) compare *tokenized* element names: a name
like ``custAddrLine1`` must break into ``cust``/``addr``/``line``/``1``
before synonym/abbreviation expansion can work. The tokenizer handles
snake_case, camelCase, digit boundaries and punctuation.
"""
from __future__ import annotations

import re

_VOWELS = "aeiou"

# camelCase boundary: lower-or-digit followed by upper.
_CAMEL = re.compile(r"(?<=[a-z0-9])(?=[A-Z])")
# runs of letters or runs of digits
_ALNUM = re.compile(r"[a-zA-Z]+|[0-9]+")


def tokenize(name: str) -> list[str]:
    """Split a column/table name into lowercase tokens.

    ``'custAddr_Line1'`` -> ``['cust', 'addr', 'line', '1']``.
    Returns ``[]`` for names with no alphanumeric content.
    """
    spaced = _CAMEL.sub(" ", name)
    return [m.group(0).lower() for m in _ALNUM.finditer(spaced)]


def normalize_token(tok: str) -> str:
    """Lowercase and strip a token (idempotent)."""
    return tok.strip().lower()


def drop_vowels(name: str) -> str:
    """Remove interior vowels from each token, keeping the first letter.

    This mirrors the "drop vowels" schema-noise rule of the fabricator
    (§IV), e.g. ``'customer'`` -> ``'cstmr'``. The first character is
    kept even if it is a vowel so names remain pronounceable-ish and
    non-empty.
    """
    out = []
    for i, ch in enumerate(name):
        if i > 0 and ch.lower() in _VOWELS and name[i - 1].isalpha():
            continue
        out.append(ch)
    return "".join(out)
