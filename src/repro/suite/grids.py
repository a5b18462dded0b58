"""Method parameterization grids (paper Table II).

The full grids reproduce the paper's **135 configurations** exactly:

=====================  =========================================  =====
method                 axes                                       runs
=====================  =========================================  =====
Cupid                  leaf_w_struct,w_struct ∈ [0,0.6] step 0.2;   96
                       th_accept ∈ [0.3,0.8] step 0.1
Similarity Flooding    inverse_average, fixpoint C                   1
COMA                   strategy ∈ {schema, instance}, th 0           2
Distribution-based #1  θ1,θ2 ∈ [0.1,0.2] step 0.05                   9
Distribution-based #2  θ1,θ2 ∈ [0.3,0.5] step 0.1                    9
SemProp                minh ∈ {0.2,0.3}; sem ∈ {0.4,0.5,0.6};       12
                       coh ∈ {0.2,0.4}
EmbDI                  word2vec(→PPMI+SVD), len 60, win 3, dim 300   1
Jaccard-Levenshtein    threshold ∈ [0.4,0.8] step 0.1                5
=====================  =========================================  =====
                                                           total   135

``reduced=True`` grids subsample each axis for the benchmark harness
(the exact reduction is documented in EXPERIMENTS.md); unit tests use
the full grids' definitions, benches the reduced ones.
"""
from __future__ import annotations

from typing import Callable

from repro.matchers import (
    ComaMatcher,
    CupidMatcher,
    DistributionBasedMatcher,
    EmbDIMatcher,
    JaccardLevenshteinMatcher,
    Matcher,
    SemPropMatcher,
    SimilarityFloodingMatcher,
)
from repro.valentine_data.ontology import Ontology


def _steps(lo: float, hi: float, step: float) -> list[float]:
    out, v = [], lo
    while v <= hi + 1e-9:
        out.append(round(v, 4))
        v += step
    return out


def cupid_grid(*, reduced: bool = False) -> list[Matcher]:
    lw = [0.0, 0.4] if reduced else _steps(0.0, 0.6, 0.2)
    ws = [0.0, 0.4] if reduced else _steps(0.0, 0.6, 0.2)
    th = [0.3, 0.5, 0.7] if reduced else _steps(0.3, 0.8, 0.1)
    return [CupidMatcher(w_struct=w, leaf_w_struct=l, th_accept=t)
            for l in lw for w in ws for t in th]


def similarity_flooding_grid(*, reduced: bool = False) -> list[Matcher]:
    return [SimilarityFloodingMatcher()]


def coma_grid(*, reduced: bool = False, strategy: str | None = None,
              max_values: int = 1000) -> list[Matcher]:
    strategies = [strategy] if strategy else ["schema", "instance"]
    return [ComaMatcher(s, threshold=0.0, max_values=max_values)
            for s in strategies]


def distribution_grid(*, variant: int = 1, reduced: bool = False,
                      max_values: int = 2000) -> list[Matcher]:
    if variant == 1:
        thetas = [0.1, 0.2] if reduced else _steps(0.1, 0.2, 0.05)
    elif variant == 2:
        thetas = [0.3, 0.5] if reduced else _steps(0.3, 0.5, 0.1)
    else:
        raise ValueError(f"variant must be 1 or 2, got {variant}")
    return [DistributionBasedMatcher(theta1=a, theta2=b,
                                     max_values=max_values)
            for a in thetas for b in thetas]


def semprop_grid(ontology: Ontology, *, reduced: bool = False,
                 max_values: int = 2000) -> list[Matcher]:
    minh = [0.2, 0.3]
    sem = [0.4, 0.6] if reduced else [0.4, 0.5, 0.6]
    coh = [0.2] if reduced else [0.2, 0.4]
    return [SemPropMatcher(ontology, minhash_threshold=m, sem_threshold=s,
                           coh_sem_threshold=c, max_values=max_values)
            for m in minh for s in sem for c in coh]


def embdi_grid(*, reduced: bool = False, max_rows: int = 1500,
               max_starts: int = 1500) -> list[Matcher]:
    return [EmbDIMatcher(n_dimensions=300, window_size=3, sentence_length=60,
                         max_rows=max_rows, max_starts=max_starts)]


def jaccard_levenshtein_grid(*, reduced: bool = False,
                             max_values: int = 1000) -> list[Matcher]:
    th = [0.4, 0.6, 0.8] if reduced else _steps(0.4, 0.8, 0.1)
    return [JaccardLevenshteinMatcher(t, max_values=max_values) for t in th]


#: name -> grid builder, for enumerating the whole Table II.
method_grids: dict[str, Callable[..., list[Matcher]]] = {
    "cupid": cupid_grid,
    "similarity_flooding": similarity_flooding_grid,
    "coma": coma_grid,
    "distribution_based_1": lambda **kw: distribution_grid(variant=1, **kw),
    "distribution_based_2": lambda **kw: distribution_grid(variant=2, **kw),
    "jaccard_levenshtein": jaccard_levenshtein_grid,
    "embdi": embdi_grid,
}


def grid_size(*, reduced: bool = False,
              with_semprop_ontology: Ontology | None = None) -> int:
    """Total configuration count (135 at full scale, as in the paper)."""
    n = sum(len(g(reduced=reduced)) for g in method_grids.values())
    if with_semprop_ontology is not None:
        n += len(semprop_grid(with_semprop_ontology, reduced=reduced))
    return n
