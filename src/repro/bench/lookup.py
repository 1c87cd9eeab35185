"""Scheme-agnostic index-lookup harness (Figs. 7/8 analogue).

Runs a SyntheticTree query against each of the four index schemes,
measuring (1) lookup wall time to materialize the candidate-sentence set
and (2) the *index effectiveness score*: |true sentences| / |returned
sentences| (§6.2.2), with ground truth from the full-scan matcher.
"""
from __future__ import annotations

from dataclasses import dataclass
from time import perf_counter

from pyspark.sql import DataFrame

from ..indexing import advinverted, inverted, subtree
from ..indexing.koko_index import KokoIndex
from ..koko import dpli, fullscan, normalize
from .synthetic_tree import TreeQuery


@dataclass
class LookupResult:
    scheme: str
    query: str
    seconds: float
    n_returned: int
    n_true: int
    effectiveness: float
    supported: bool = True


def _abs_paths(tq: TreeQuery) -> tuple[normalize.NormQuery, list]:
    nq = normalize.normalize(tq.query())
    dominants = sorted({nq.dominant[v] for v in nq.abs_paths})
    return nq, [nq.abs_paths[d] for d in dominants]


def koko_candidates(index: KokoIndex, paths: list) -> DataFrame:
    cand: DataFrame | None = None
    for steps in paths:
        s = dpli.path_bindings(index, steps).select("x").distinct()
        cand = s if cand is None else cand.join(s, "x")
    assert cand is not None
    return cand


def run_lookup(
    scheme: str,
    index,
    tokens: DataFrame,
    tq: TreeQuery,
    true_sids: set | None = None,
) -> LookupResult:
    nq, dom_paths = _abs_paths(tq)
    all_paths = list(nq.abs_paths.values())
    try:
        t0 = perf_counter()
        if scheme == "koko":
            cand = koko_candidates(index, dom_paths)
        elif scheme == "inverted":
            cand = inverted.candidate_sentences(index, all_paths)
        elif scheme == "advinverted":
            cand = advinverted.candidate_sentences(index, all_paths)
        elif scheme == "subtree":
            cand = subtree.candidate_sentences(index, all_paths)
        else:
            raise ValueError(scheme)
        got = {r.x for r in cand.collect()}
        secs = perf_counter() - t0
    except subtree.Unsupported:
        return LookupResult(scheme, tq.name, 0.0, 0, 0, 0.0, supported=False)
    if true_sids is None:
        true_sids = {r.x for r in fullscan.true_sids(tokens, nq).collect()}
    eff = (len(true_sids & got) / len(got)) if got else 1.0
    return LookupResult(
        scheme, tq.name, secs, len(got), len(true_sids), eff
    )


def ground_truth(tokens: DataFrame, tq: TreeQuery) -> set:
    nq = normalize.normalize(tq.query())
    return {r.x for r in fullscan.true_sids(tokens, nq).collect()}
