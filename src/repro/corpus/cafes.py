"""Cafe-blog and tweet corpora with ground truth (§6.1 substitute).

The paper scrapes BARISTAMAG (84 articles, short) and SPRUDGE (1645
articles, longer) and crowdsources gold cafe names. We plant cafe names
into generated blog docs and emit the gold set alongside. The phenomena
the experiment tests are reproduced directly:

- some cafes have giveaway name heads ("… Cafe", "… Roasters") → matched
  by the query's ``contains`` conditions;
- some receive *strong boolean* evidence ("X , a cafe ," / "cafe called X");
- some receive only *paraphrased descriptor* evidence ("sells espresso",
  "hired the star barista", …) drawn from the same clusters the embedding
  substrate knows — only evidence aggregation + descriptor expansion can
  recover these;
- documented error sources appear as distractor entities: cities near
  coffee talk, street addresses, espresso-machine brands, festivals.

Style knobs: ``barista`` docs are short and lean on descriptor evidence
(Fig. 5: descriptors help); ``sprudge`` docs are longer with more strong
evidence (descriptors don't add much); ``tweets`` are 1-sentence docs of
facilities/teams (Fig. 4: aggregation can't help).

Corpora here are ≤ ~2K docs, so generation is driver-side pandas (the
scalability corpus in ``generator.py`` is the distributed one).
"""
from __future__ import annotations

import zlib
from dataclasses import dataclass

import numpy as np
import pandas as pd
from pyspark.sql import DataFrame, SparkSession

from . import vocab
from .generator import TOKEN_SCHEMA, resolve_template
from .templates import Template, Tok


def _stable_hash(s: str) -> int:
    """Process-stable string hash (``hash()`` is salted per interpreter)."""
    return zlib.crc32(s.encode())


def _t(word: str, pos: str, label: str, head: int) -> Tok:
    return Tok(word, pos, label, head)


def _name_tokens(name: list[str], head_of_last: int, label: str) -> tuple[Tok, ...]:
    """Multi-token PROPN entity: leading tokens are nn children of the last."""
    last = len(name) - 1
    toks = [_t(w, "PROPN", "nn", len(name) - 1) for w in name[:-1]]
    toks.append(_t(name[last], "PROPN", label, head_of_last))
    return tuple(toks)


def _ent(n: int, etype: str = "Entity") -> tuple[tuple[int, int, str], ...]:
    return ((0, n - 1, etype),)


# --- evidence sentence builders; each returns a Template whose entity 0 is
# the cafe mention (entities tuple gives absolute token spans).

def s_appos(name: list[str]) -> Template:
    n = len(name)
    toks = _name_tokens(name, n + 4, "nsubj") + (
        _t(",", "PUNCT", "punct", n - 1),
        _t("a", "DET", "det", n + 2),
        _t("cafe", "NOUN", "appos", n - 1),
        _t(",", "PUNCT", "punct", n - 1),
        _t("opened", "VERB", "root", -1),
        _t("recently", "ADV", "advmod", n + 4),
        _t(".", "PUNCT", "punct", n + 4),
    )
    return Template("s_appos", toks, _ent(n))


def s_called(name: list[str]) -> Template:
    n = len(name)
    toks = (
        _t("the", "DET", "det", 1),
        _t("cafe", "NOUN", "root", -1),
        _t("called", "VERB", "acl", 1),
    ) + tuple(
        Tok(w, "PROPN", "nn", 3 + len(name) - 1) for w in name[:-1]
    ) + (
        _t(name[-1], "PROPN", "oprd", 2),
        _t(".", "PUNCT", "punct", 1),
    )
    return Template("s_called", toks, ((3, 3 + n - 1, "Entity"),))


def s_evidence(name: list[str], verb: str, obj: str, adj: str | None = None) -> Template:
    """"<Name> <verb> [adj] <obj> ." — descriptor-matchable evidence."""
    n = len(name)
    root = n  # verb index
    toks = list(_name_tokens(name, root, "nsubj"))
    toks.append(_t(verb, "VERB", "root", -1))
    obj_idx = root + (2 if adj else 1)
    if adj:
        toks.append(_t(adj, "ADJ", "amod", obj_idx))
    toks.append(_t(obj, "NOUN", "dobj", root))
    toks.append(_t(".", "PUNCT", "punct", root))
    return Template("s_evidence", tuple(toks), _ent(n))


def s_hired_barista(name: list[str], verb: str) -> Template:
    n = len(name)
    toks = list(_name_tokens(name, n, "nsubj"))
    toks += [
        _t(verb, "VERB", "root", -1),
        _t("the", "DET", "det", n + 3),
        _t("star", "ADJ", "amod", n + 3),
        _t("barista", "NOUN", "dobj", n),
        _t(".", "PUNCT", "punct", n),
    ]
    return Template("s_hired", tuple(toks), _ent(n))


# --- distractors (the Appendix's documented error sources)

def s_city_coffee(city: str) -> Template:
    return Template(
        "s_city_coffee",
        (
            _t(city, "PROPN", "nsubj", 1),
            _t("produces", "VERB", "root", -1),
            _t("and", "CCONJ", "cc", 1),
            _t("sells", "VERB", "conj", 1),
            _t("the", "DET", "det", 6),
            _t("best", "ADJ", "amod", 6),
            _t("coffee", "NOUN", "dobj", 3),
            _t(".", "PUNCT", "punct", 1),
        ),
        ((0, 0, "GPE"),),
    )


def s_address(num: str, street: str) -> Template:
    return Template(
        "s_address",
        (
            _t("The", "DET", "det", 2),
            _t("new", "ADJ", "amod", 2),
            _t("cafe", "NOUN", "nsubj", 7),
            _t("on", "ADP", "prep", 2),
            _t(num, "NUM", "nn", 6),
            _t(street, "PROPN", "nn", 6),
            _t("St.", "PROPN", "pobj", 3),
            _t("has", "VERB", "root", -1),
            _t("espresso", "NOUN", "dobj", 7),
            _t(".", "PUNCT", "punct", 7),
        ),
        ((4, 6, "Facility"),),
    )


def s_brand() -> Template:
    return Template(
        "s_brand",
        (
            _t("They", "PRON", "nsubj", 1),
            _t("use", "VERB", "root", -1),
            _t("a", "DET", "det", 4),
            _t("La", "PROPN", "nn", 4),
            _t("Marzocco", "PROPN", "dobj", 1),
            _t("machine", "NOUN", "appos", 4),
            _t(".", "PUNCT", "punct", 1),
        ),
        ((3, 4, "Org"),),
    )


def s_festival(mod: str, fest: list[str]) -> Template:
    name = [mod] + fest
    n = len(name)
    toks = list(_name_tokens(name, n, "nsubj"))
    toks += [
        _t("begins", "VERB", "root", -1),
        _t("tomorrow", "ADV", "advmod", n),
        _t(".", "PUNCT", "punct", n),
    ]
    return Template("s_festival", tuple(toks), _ent(n))


def s_filler(rng: np.random.Generator) -> Template:
    noun = vocab.PLAIN_NOUNS[int(rng.integers(len(vocab.PLAIN_NOUNS)))]
    verb = vocab.PLAIN_VERBS[int(rng.integers(len(vocab.PLAIN_VERBS)))]
    adj = vocab.ADJS[int(rng.integers(len(vocab.ADJS)))]
    return Template(
        "s_filler",
        (
            _t("The", "DET", "det", 1),
            _t(noun, "NOUN", "nsubj", 2),
            _t(verb, "VERB", "root", -1),
            _t(adj, "ADJ", "oprd", 2),
            _t(".", "PUNCT", "punct", 2),
        ),
    )


@dataclass
class QualityCorpus:
    tokens: DataFrame
    truth: pd.DataFrame  # columns: doc_id, entity


def _pick(rng: np.random.Generator, pool: list[str]) -> str:
    return pool[int(rng.integers(len(pool)))]


_SYLLABLES = [
    "ka", "ve", "lo", "mi", "ra", "su", "ten", "bar", "nel", "do",
    "fi", "gu", "pa", "ze", "cor", "lin", "mo", "sa", "tu", "wen",
]


def _gen_word(rng: np.random.Generator) -> str:
    """Open-vocabulary proper name (2–3 syllables). Real cafe names are
    not drawn from a closed pool — a token-identity feature must not be
    able to memorize them across a train/test split."""
    n = 2 + int(rng.integers(2))
    w = "".join(_pick(rng, _SYLLABLES) for _ in range(n))
    return w.capitalize()


def _cafe_name(rng: np.random.Generator, giveaway: bool) -> list[str]:
    if giveaway:
        return [_gen_word(rng), _pick(rng, vocab.CAFE_HEADS)]
    return [_gen_word(rng), _gen_word(rng)]


def _restaurant_name(rng: np.random.Generator) -> list[str]:
    # Half carry a tell-tale head ("Bistro"); half look exactly like a
    # plain-named cafe — only evidence *volume* separates them.
    if rng.random() < 0.5:
        return [_gen_word(rng), _pick(rng, vocab.RESTAURANT_HEADS)]
    return [_gen_word(rng), _gen_word(rng)]


def cafe_corpus(
    spark: SparkSession, n_docs: int, *, style: str = "barista", seed: int = 7
) -> QualityCorpus:
    """Blog corpus with planted gold cafe names (styles: barista/sprudge)."""
    assert style in {"barista", "sprudge"}
    rng = np.random.default_rng([seed, _stable_hash(style)])
    rows: list[dict] = []
    truth: list[dict] = []
    for doc_id in range(n_docs):
        sents: list[Template] = []
        if rng.random() < 0.65:  # doc introduces a cafe
            giveaway = rng.random() < (0.45 if style == "sprudge" else 0.3)
            name = _cafe_name(rng, giveaway)
            truth.append({"doc_id": doc_id, "entity": " ".join(name)})
            p_strong = 0.85 if style == "sprudge" else 0.25
            if rng.random() < p_strong:
                sents.append(s_appos(name) if rng.random() < 0.5 else s_called(name))
            n_desc = int(rng.integers(2, 4)) if style == "barista" else int(rng.integers(1, 4))
            for _ in range(n_desc):
                if rng.random() < 0.6:
                    verb, obj = vocab.EVIDENCE_PHRASES["serves coffee"][
                        int(rng.integers(len(vocab.EVIDENCE_PHRASES["serves coffee"])))
                    ]
                    adj = _pick(rng, vocab.ADJS) if rng.random() < 0.4 else None
                    sents.append(s_evidence(name, verb, obj, adj))
                else:
                    verb, _ = vocab.EVIDENCE_PHRASES["employs baristas"][
                        int(rng.integers(len(vocab.EVIDENCE_PHRASES["employs baristas"])))
                    ]
                    sents.append(s_hired_barista(name, verb))
        # distractors
        if rng.random() < 0.45:
            # a restaurant with one genuine coffee-evidence sentence: not a
            # cafe, not excludable — passes low thresholds only
            rest = _restaurant_name(rng)
            verb, obj = vocab.EVIDENCE_PHRASES["serves coffee"][
                int(rng.integers(len(vocab.EVIDENCE_PHRASES["serves coffee"])))
            ]
            sents.append(s_evidence(rest, verb, obj))
        if rng.random() < 0.5:
            sents.append(s_city_coffee(_pick(rng, vocab.CITIES)))
        if rng.random() < 0.3:
            sents.append(s_address(str(int(rng.integers(10, 999))), _pick(rng, vocab.STREETS)))
        if rng.random() < 0.2:
            sents.append(s_brand())
        if rng.random() < 0.15:
            sents.append(s_festival(_pick(rng, vocab.CAFE_MODS), ["Brewers", "Cup"]))
        n_fill = int(rng.integers(1, 3 if style == "barista" else 6))
        sents.extend(s_filler(rng) for _ in range(n_fill))
        order = rng.permutation(len(sents))
        for i, j in enumerate(order):
            rows.extend(resolve_template(sents[j], rng, doc_id, i))
    pdf = pd.DataFrame(rows, columns=[f.name for f in TOKEN_SCHEMA.fields])
    return QualityCorpus(
        tokens=spark.createDataFrame(pdf, schema=TOKEN_SCHEMA),
        truth=pd.DataFrame(truth, columns=["doc_id", "entity"]),
    )


# ------------------------------------------------------------------ tweets

def s_at_facility(name: list[str]) -> Template:
    n = len(name)
    toks = [
        _t("We", "PRON", "nsubj", 1),
        _t("are", "VERB", "root", -1),
        _t("at", "ADP", "prep", 1),
    ] + [Tok(w, "PROPN", "nn", 3 + n - 1) for w in name[:-1]] + [
        _t(name[-1], "PROPN", "pobj", 2),
        _t("tonight", "ADV", "advmod", 1),
        _t(".", "PUNCT", "punct", 1),
    ]
    return Template("s_at_fac", tuple(toks), ((3, 3 + n - 1, "Facility"),))


def s_went_to(name: list[str]) -> Template:
    n = len(name)
    toks = [
        _t("I", "PRON", "nsubj", 1),
        _t("went", "VERB", "root", -1),
        _t("to", "ADP", "prep", 1),
    ] + [Tok(w, "PROPN", "nn", 3 + n - 1) for w in name[:-1]] + [
        _t(name[-1], "PROPN", "pobj", 2),
        _t(".", "PUNCT", "punct", 1),
    ]
    return Template("s_went_to", tuple(toks), ((3, 3 + n - 1, "Facility"),))


def s_at_time(hour: str) -> Template:
    return Template(
        "s_at_time",
        (
            _t("Game", "NOUN", "nsubj", 1),
            _t("starts", "VERB", "root", -1),
            _t("at", "ADP", "prep", 1),
            _t(hour, "NUM", "nn", 4),
            _t("pm", "NOUN", "pobj", 2),
            _t(".", "PUNCT", "punct", 1),
        ),
        ((3, 4, "Date"),),
    )


def s_team(team: str) -> Template:
    return Template(
        "s_team",
        (
            _t("Go", "VERB", "root", -1),
            _t(team, "PROPN", "dobj", 0),
            _t("!", "PUNCT", "punct", 0),
        ),
        ((1, 1, "Team"),),
    )


def tweet_corpus(
    spark: SparkSession, n_docs: int, *, target: str = "facility", seed: int = 11
) -> QualityCorpus:
    """WNUT substitute: 1-sentence docs; gold = facilities or teams."""
    rng = np.random.default_rng([seed, _stable_hash(target)])
    rows: list[dict] = []
    truth: list[dict] = []
    for doc_id in range(n_docs):
        r = rng.random()
        if target == "facility" and r < 0.4:
            name = [_pick(rng, vocab.CAFE_MODS), _pick(rng, vocab.FACILITIES)]
            tpl = s_at_facility(name) if rng.random() < 0.6 else s_went_to(name)
            truth.append({"doc_id": doc_id, "entity": " ".join(name)})
        elif target == "team" and r < 0.4:
            team = _pick(rng, vocab.TEAMS)
            tpl = s_team(team)
            truth.append({"doc_id": doc_id, "entity": team})
        elif r < 0.55:
            tpl = s_at_time(str(int(rng.integers(1, 12))))
        else:
            tpl = s_filler(rng)
        rows.extend(resolve_template(tpl, rng, doc_id, 0))
    pdf = pd.DataFrame(rows, columns=[f.name for f in TOKEN_SCHEMA.fields])
    return QualityCorpus(
        tokens=spark.createDataFrame(pdf, schema=TOKEN_SCHEMA),
        truth=pd.DataFrame(truth, columns=["doc_id", "entity"]),
    )
