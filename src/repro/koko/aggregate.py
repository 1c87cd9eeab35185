"""Satisfying-clause evaluation and document-level evidence aggregation
(§2.2, §4.4).

For every candidate value of a satisfying-clause variable, the score is
``Σ_i w_i · m_i(e)`` over the clause's conditions:

- string-level booleans (``contains`` / ``mentions`` / ``matches``) and
  ``similar_to`` need no corpus scan;
- evidence conditions (``follows`` / ``precedes`` / ``near`` /
  descriptors) scan every sentence of the document where the value is
  mentioned: booleans contribute 0/1 (any-sentence semantics), ``near``
  contributes its best ``1/(1+distance)``, and descriptor confidences are
  summed over sentences — the collective-evidence semantics that
  distinguishes KOKO from single-sentence extractors.

Descriptor confidence per sentence follows §4.4.1 exactly:
``max_i Σ_j match(d_i, c_j)`` with ``match = k_i · l_j`` when the
expanded phrase occurs (in order, gaps allowed) in the canonical clause,
restricted to the side of the mention the condition names.

Evaluation is distributed per document via ``applyInPandas``; candidate
values are broadcast in the UDF closure (they are small — distinct
extraction values).
"""
from __future__ import annotations

import re
from functools import lru_cache

import pandas as pd
from pyspark.sql import DataFrame
from pyspark.sql import functions as F
from pyspark.sql import types as T

from ..corpus import vocab
from ..nlp import decompose, embeddings
from .ast import SatCond, Satisfying
from .evaluate import emitted_vars
from .normalize import NormQuery

DICTIONARIES: dict[str, set[str]] = {
    "Location": set(vocab.CITIES) | set(vocab.COUNTRIES),
}

_EXPANSION_K = 32  # fixed expansion budget (§5: "a fixed number of expanded terms")


def _tokenize(s: str) -> list[str]:
    """Tokenize a condition argument the way the corpus is tokenized
    (punctuation split off)."""
    return re.findall(r"[A-Za-z0-9_'-]+|[^\sA-Za-z0-9]", s)


@lru_cache(maxsize=256)
def _expanded(descriptor: str) -> tuple[tuple[tuple[str, ...], float], ...]:
    return tuple(
        (tuple(p.split()), k) for p, k in embeddings.expand(descriptor, k=_EXPANSION_K)
    )


def _occurs(seq: tuple[str, ...], words: list[str]) -> bool:
    """Word sequence occurs in order with arbitrary gaps (case folded)."""
    it = iter(w.lower() for w in words)
    return all(any(w == x for x in it) for w in (s.lower() for s in seq))


_SCAN_KINDS = frozenset({"follows", "precedes", "near", "desc_right", "desc_left"})


def _string_level(cond: SatCond, value: str) -> float | None:
    """m_i for conditions that need no corpus scan; None ⇒ corpus scan."""
    if cond.kind == "contains":
        return 1.0 if cond.arg in value else 0.0
    if cond.kind == "mentions":
        return 1.0 if cond.arg.lower() in value.lower() else 0.0
    if cond.kind == "matches":
        return 1.0 if re.fullmatch(cond.arg, value) else 0.0
    if cond.kind == "similar_to":
        return max(embeddings.similarity(w, cond.arg) for w in value.split())
    return None


def _mentions(sent: pd.DataFrame, value: str) -> list[tuple[int, int]]:
    """Token spans where ``value`` is mentioned in this sentence: entity
    spans with that text, else literal token-sequence occurrences."""
    spans = [
        (int(r.ent_lo), int(r.ent_hi))
        for _, r in sent[(sent.ent_text == value) & (sent.tid == sent.ent_lo)].iterrows()
    ]
    if spans:
        return spans
    toks = list(sent.token)
    vt = _tokenize(value)
    return [
        (i, i + len(vt) - 1)
        for i in range(len(toks) - len(vt) + 1)
        if toks[i : i + len(vt)] == vt
    ]


def _descriptor_conf(
    sent: pd.DataFrame, span: tuple[int, int], cond: SatCond
) -> float:
    side = "right" if cond.kind == "desc_right" else "left"
    toks = list(sent.token)
    heads = list(sent["head"])
    labels = list(sent.label)
    lo, hi = span
    best = 0.0
    for phrase, k_i in _expanded(cond.arg):
        total = 0.0
        for tids, l_j in decompose.clauses(heads, labels):
            if side == "right":
                window = [toks[i] for i in tids if i > hi]
            else:
                window = [toks[i] for i in tids if i < lo]
            if window and _occurs(phrase, window):
                total += k_i * l_j
        best = max(best, total)
    return best


def _evidence_scores(
    doc: pd.DataFrame, values: list[str], conds: list[SatCond]
) -> dict[str, list[float]]:
    """m_i(e) per value for the corpus-scanning conditions of one clause."""
    out = {v: [0.0] * len(conds) for v in values}
    for _, sent in doc.groupby("sid"):
        sent = sent.sort_values("tid")
        toks = list(sent.token)
        for v in values:
            spans = _mentions(sent, v)
            if not spans:
                continue
            for ci, cond in enumerate(conds):
                if cond.kind in ("follows", "precedes"):
                    arg = _tokenize(cond.arg)
                    hit = any(
                        (
                            toks[hi + 1 : hi + 1 + len(arg)] == arg
                            if cond.kind == "follows"
                            else toks[max(0, lo - len(arg)) : lo] == arg
                        )
                        for lo, hi in spans
                    )
                    if hit:
                        out[v][ci] = 1.0
                elif cond.kind == "near":
                    arg = _tokenize(cond.arg)
                    occ = [
                        i
                        for i in range(len(toks) - len(arg) + 1)
                        if toks[i : i + len(arg)] == arg
                    ]
                    for lo, hi in spans:
                        for i in occ:
                            dist = max(0, max(lo - (i + len(arg) - 1), i - hi) - 1)
                            out[v][ci] = max(out[v][ci], 1.0 / (1.0 + dist))
                elif cond.kind in ("desc_right", "desc_left"):
                    conf = max(
                        _descriptor_conf(sent, sp, cond) for sp in spans
                    )
                    out[v][ci] += conf  # summed over sentences (§4.4.1)
    return out


def score_values(
    tokens: DataFrame, candidates: pd.DataFrame, clause: Satisfying
) -> pd.DataFrame:
    """Score every (doc_id, value) candidate for one satisfying clause.
    ``candidates`` columns: doc_id, value. Returns doc_id, value, score."""
    cand_by_doc: dict[int, list[str]] = {
        int(d): sorted(g["value"].unique())
        for d, g in candidates.groupby("doc_id")
    }
    conds = list(clause.conds)
    scan_idx = [i for i, c in enumerate(conds) if c.kind in _SCAN_KINDS]
    schema = T.StructType(
        [
            T.StructField("doc_id", T.LongType()),
            T.StructField("value", T.StringType()),
            T.StructField("score", T.DoubleType()),
        ]
    )

    def run_doc(pdf: pd.DataFrame) -> pd.DataFrame:
        doc_id = int(pdf.doc_id.iloc[0])
        values = cand_by_doc.get(doc_id, [])
        if not values:
            return pd.DataFrame(columns=["doc_id", "value", "score"])
        scan_conds = [conds[i] for i in scan_idx]
        ev = (
            _evidence_scores(pdf, values, scan_conds)
            if scan_conds
            else {v: [] for v in values}
        )
        rows = []
        for v in values:
            score = 0.0
            k = 0
            for cond in conds:
                if cond.kind in _SCAN_KINDS:
                    m = ev[v][k]
                    k += 1
                else:
                    m = _string_level(cond, v)
                score += cond.weight * m
            rows.append({"doc_id": doc_id, "value": v, "score": score})
        return pd.DataFrame(rows)

    doc_ids = list(cand_by_doc)
    scoped = tokens.where(F.col("doc_id").isin(doc_ids)) if doc_ids else tokens.limit(0)
    return scoped.groupBy("doc_id").applyInPandas(run_doc, schema=schema).toPandas()


def excluded(value: str, conds: list[SatCond]) -> bool:
    for c in conds:
        if c.kind == "matches" and re.fullmatch(c.arg, value):
            return True
        if c.kind == "contains" and c.arg in value:
            return True
        if c.kind == "mentions" and c.arg.lower() in value.lower():
            return True
        if c.kind == "in_dict" and value in DICTIONARIES.get(c.arg, set()):
            return True
    return False


def apply_clauses(
    tokens: DataFrame, extractions: DataFrame, nq: NormQuery
) -> pd.DataFrame:
    """Filter extraction rows by every satisfying clause (doc-aggregated
    threshold) and the excluding clause; project to the output tuple.

    Returns a pandas DataFrame (final results are small relative to the
    corpus; the heavy scans above stay distributed).
    """
    ext = extractions.toPandas()
    out_cols = [v for v, _ in nq.query.outputs]
    if ext.empty:
        return pd.DataFrame(columns=["doc_id"] + out_cols)
    for clause in nq.query.satisfying:
        cand = ext[["doc_id", clause.var]].rename(columns={clause.var: "value"})
        cand = cand.dropna().drop_duplicates()
        scores = score_values(tokens, cand, clause)
        passing = scores[scores.score >= clause.threshold][["doc_id", "value"]]
        ext = ext.merge(
            passing.rename(columns={"value": clause.var}),
            on=["doc_id", clause.var],
            how="inner",
        )
    exc = nq.query.excluding
    if exc is not None and not ext.empty:
        mask = ext[exc.var].map(lambda v: not excluded(v, exc.conds))
        ext = ext[mask]
    return ext[["doc_id"] + out_cols].drop_duplicates().reset_index(drop=True)
