"""Shared value vocabularies for the synthetic dataset generators.

Small, fixed pools of realistic values. Generators draw from these with
seeded numpy RNGs, so every dataset is deterministic in its seed.
"""
from __future__ import annotations

import numpy as np

FIRST_NAMES = [
    "james", "mary", "robert", "patricia", "john", "jennifer", "michael",
    "linda", "david", "elizabeth", "william", "barbara", "richard", "susan",
    "joseph", "jessica", "thomas", "sarah", "charles", "karen", "chris",
    "nancy", "daniel", "lisa", "matthew", "betty", "anthony", "margaret",
    "mark", "sandra", "donald", "ashley", "steven", "kim", "paul", "emily",
    "andrew", "donna", "joshua", "michelle",
]

LAST_NAMES = [
    "smith", "johnson", "williams", "brown", "jones", "garcia", "miller",
    "davis", "rodriguez", "martinez", "hernandez", "lopez", "gonzalez",
    "wilson", "anderson", "thomas", "taylor", "moore", "jackson", "martin",
    "lee", "perez", "thompson", "white", "harris", "sanchez", "clark",
    "ramirez", "lewis", "robinson", "walker", "young", "allen", "king",
    "wright", "scott", "torres", "nguyen", "hill", "flores",
]

CITIES = [
    "springfield", "riverside", "franklin", "greenville", "bristol",
    "clinton", "fairview", "salem", "madison", "georgetown", "arlington",
    "ashland", "dover", "hudson", "kingston", "milton", "newport",
    "oxford", "burlington", "manchester",
]

STATES = ["CA", "TX", "NY", "FL", "IL", "PA", "OH", "GA", "NC", "MI",
          "NJ", "VA", "WA", "AZ", "MA", "TN", "IN", "MO", "MD", "WI"]

COUNTRIES = ["United States", "Canada", "United Kingdom", "Germany",
             "France", "Netherlands", "Spain", "Italy", "Greece", "Sweden"]

#: alternative encodings of COUNTRIES, index-aligned (semantic-join noise)
COUNTRIES_ALT = ["USA", "CAN", "UK", "DEU", "FRA", "NLD", "ESP", "ITA",
                 "GRC", "SWE"]

STREETS = ["main st", "oak ave", "maple dr", "cedar ln", "park rd",
           "lake view", "hill crest", "elm st", "pine ave", "river rd"]

COMPANIES = [
    "acme corp", "globex", "initech", "umbrella", "stark industries",
    "wayne enterprises", "tyrell corp", "wonka industries", "cyberdyne",
    "aperture labs", "hooli", "pied piper", "dunder mifflin", "vandelay",
]

GENRES = ["rock", "pop", "country", "jazz", "blues", "soul", "folk",
          "gospel", "rockabilly", "rhythm and blues"]

RECORD_LABELS = ["sun", "rca victor", "columbia", "capitol", "decca",
                 "atlantic", "motown", "chess", "stax", "elektra"]

INSTRUMENTS = ["guitar", "piano", "vocals", "drums", "bass", "harmonica",
               "saxophone", "violin", "banjo", "organ"]

AWARDS = ["grammy award", "billboard music award", "american music award",
          "mtv video music award", "peoples choice award", "brit award"]

ORGANISMS = ["homo sapiens", "mus musculus", "rattus norvegicus",
             "escherichia coli", "saccharomyces cerevisiae",
             "danio rerio", "drosophila melanogaster"]

TISSUES = ["liver", "brain", "kidney", "heart", "lung", "muscle",
           "pancreas", "spleen", "skin", "blood"]

CELL_TYPES = ["hela", "hek293", "cho", "jurkat", "a549", "mcf7",
              "hepg2", "u2os", "k562", "pc3"]

TARGET_TYPES = ["single protein", "protein complex", "cell line",
                "organism", "tissue", "protein family", "nucleic acid"]

ASSAY_TYPES = ["binding", "functional", "adme", "toxicity", "physicochemical"]

SCRUM_STATUSES = ["todo", "in progress", "in review", "blocked", "done",
                  "cancelled"]

SCRUM_WORDS = ["migrate", "refactor", "implement", "investigate", "fix",
               "deploy", "review", "update", "design", "test", "document",
               "optimize", "integrate", "configure", "monitor"]

SCRUM_OBJECTS = ["payment service", "login flow", "risk model", "batch job",
                 "api gateway", "data pipeline", "customer portal",
                 "fraud detector", "ledger", "reporting dashboard",
                 "message queue", "auth service"]

DEPARTMENTS = ["retail banking", "wholesale banking", "risk", "compliance",
               "it operations", "data analytics", "payments", "lending"]

OS_VERSIONS = ["rhel 7.9", "rhel 8.4", "windows server 2016",
               "windows server 2019", "ubuntu 20.04", "aix 7.2"]


def hex_id(g: np.random.Generator, n: int, width: int = 12) -> np.ndarray:
    """``n`` lowercase hex identifiers (hash-like values, as in ING#1)."""
    chars = np.array(list("0123456789abcdef"))
    idx = g.integers(0, 16, size=(n, width))
    return np.array(["".join(row) for row in chars[idx]])


def phrases(g: np.random.Generator, n: int, verbs: list[str],
            objects: list[str]) -> np.ndarray:
    """Short verb–object phrases sharing vocabulary across draws."""
    v = g.choice(verbs, n)
    o = g.choice(objects, n)
    return np.char.add(np.char.add(v, " "), o)
