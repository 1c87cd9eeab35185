"""Odin baseline [44] (§6.3).

Odin is a CPSL-style rule engine with no indices: every rule is matched
against every sentence (iterating until no new matches; with priorities
supplied, one prioritized pass). We translate KOKO queries by dropping
the satisfying clause (Odin cannot aggregate evidence) and run the same
per-sentence matcher over the **entire** corpus — no DPLI pruning, which
is exactly where the paper's 40×/23×/1.3× slowdowns come from: the more
selective the query, the more KOKO's indices skip and the larger Odin's
relative cost.
"""
from __future__ import annotations

from dataclasses import dataclass, replace
from time import perf_counter

import pandas as pd
from pyspark.sql import DataFrame

from ..koko import evaluate, normalize
from ..koko.ast import Query


@dataclass
class OdinResult:
    results: pd.DataFrame
    seconds: float


def translate(query: Query) -> Query:
    """Odin's version of a KOKO query: extract clause only."""
    return replace(query, satisfying=[], excluding=None)


def run(tokens: DataFrame, query: Query) -> OdinResult:
    nq = normalize.normalize(translate(query))
    t0 = perf_counter()
    ext = evaluate.evaluate_corpus(tokens, nq, candidate_sids=None)
    out_cols = [v for v, _ in nq.query.outputs]
    res = ext.toPandas()[["doc_id"] + out_cols].drop_duplicates().reset_index(drop=True)
    return OdinResult(results=res, seconds=perf_counter() - t0)
