"""Hand-annotated fixtures reproducing the paper's example sentences.

The paper publishes exact index contents for two sentences (Examples 3.1 —
3.3): the Figure-1 sentence (sid 0) and the "Anna ate some delicious
cheesecake…" sentence (sid 1). The annotations below are chosen so the
derived quintuples match the paper's tables exactly, e.g.
``ate (0,1,0-16,0)``, ``cream (0,5,2-9,1)``, ``delicious (0,9,9-9,3)``,
``cheesecake (1,4,2-11,1)``, and PL-index postings like
``/root/dobj/nn → chocolate(0,3,3-3,2), ice(0,4,4-4,2)``.

Example 2.2's S1/S2 sentences are provided as separate documents for the
``similarTo`` experiment.
"""
from __future__ import annotations

import numpy as np
import pandas as pd
from pyspark.sql import DataFrame, SparkSession

from .generator import TOKEN_SCHEMA, resolve_template
from .templates import Template, Tok

_RNG = np.random.default_rng(0)  # fixtures have no slots; rng is unused


def _t(word: str, pos: str, label: str, head: int) -> Tok:
    return Tok(word, pos, label, head)


# "I ate a chocolate ice cream , which was delicious , and also ate a pie ."
FIG1 = Template(
    "fig1",
    (
        _t("I", "PRON", "nsubj", 1),          # 0  (0,0,0-0,1)
        _t("ate", "VERB", "root", -1),        # 1  (0,1,0-16,0)
        _t("a", "DET", "det", 5),             # 2  (0,2,2-2,2)
        _t("chocolate", "NOUN", "nn", 5),     # 3  (0,3,3-3,2)
        _t("ice", "NOUN", "nn", 5),           # 4  (0,4,4-4,2)
        _t("cream", "NOUN", "dobj", 1),       # 5  (0,5,2-9,1)
        _t(",", "PUNCT", "punct", 5),         # 6
        _t("which", "PRON", "nsubj", 8),      # 7
        _t("was", "VERB", "rcmod", 5),        # 8
        _t("delicious", "ADJ", "acomp", 8),   # 9  (0,9,9-9,3)
        _t(",", "PUNCT", "punct", 1),         # 10
        _t("and", "CCONJ", "cc", 1),          # 11
        _t("also", "ADV", "advmod", 13),      # 12
        _t("ate", "VERB", "conj", 1),         # 13
        _t("a", "DET", "det", 15),            # 14
        _t("pie", "NOUN", "dobj", 13),        # 15
        _t(".", "PUNCT", "punct", 1),         # 16
    ),
    entities=((3, 5, "Entity"),),  # "chocolate ice cream" (0,3-5)
)

# "Anna ate some delicious cheesecake that she bought at a grocery store ."
EX31 = Template(
    "ex31",
    (
        _t("Anna", "PROPN", "nsubj", 1),      # 0  (1,0,0-0,1)
        _t("ate", "VERB", "root", -1),        # 1  (1,1,0-12,0)
        _t("some", "DET", "det", 4),          # 2  (1,2,2-2,2)
        _t("delicious", "ADJ", "amod", 4),    # 3  (1,3,3-3,2)
        _t("cheesecake", "NOUN", "dobj", 1),  # 4  (1,4,2-11,1)
        _t("that", "PRON", "dobj", 7),        # 5
        _t("she", "PRON", "nsubj", 7),        # 6
        _t("bought", "VERB", "rcmod", 4),     # 7
        _t("at", "ADP", "prep", 7),           # 8
        _t("a", "DET", "det", 11),            # 9
        _t("grocery", "NOUN", "nn", 11),      # 10
        _t("store", "NOUN", "pobj", 8),       # 11
        _t(".", "PUNCT", "punct", 1),         # 12
    ),
    entities=((4, 4, "Entity"), (10, 11, "Entity")),  # cheesecake; grocery store
)

# Example 2.2: two syntactically identical sentences.
def _such_as(w1: str, w2: str) -> Template:
    return Template(
        f"ex22_{w1.lower()}",
        (
            _t("cities", "NOUN", "root", -1),
            _t("in", "ADP", "prep", 0),
            _t("asian", "ADJ", "amod", 3),
            _t("countries", "NOUN", "pobj", 1),
            _t("such", "ADJ", "amod", 5),
            _t("as", "ADP", "prep", 3),
            _t(w1, "PROPN", "pobj", 5),
            _t("and", "CCONJ", "cc", 6),
            _t(w2, "PROPN", "conj", 6),
            _t(".", "PUNCT", "punct", 0),
        ),
        entities=((6, 6, "GPE"), (8, 8, "GPE")),
    )


EX22_S1 = _such_as("China", "Japan")
EX22_S2 = _such_as("Beijing", "Tokyo")


def paper_rows() -> pd.DataFrame:
    """The two §3 example sentences as one document (sids 0 and 1)."""
    rows = resolve_template(FIG1, _RNG, 0, 0) + resolve_template(EX31, _RNG, 0, 1)
    # doc_id=0 ⇒ sids come out as 0 and 1, matching the paper's numbering.
    return pd.DataFrame(rows, columns=[f.name for f in TOKEN_SCHEMA.fields])


def paper_tokens(spark: SparkSession) -> DataFrame:
    return spark.createDataFrame(paper_rows(), schema=TOKEN_SCHEMA)


def ex22_rows() -> pd.DataFrame:
    """S1 in doc 0 (sid 0), S2 in doc 1 (sid 1000) — separate documents."""
    rows = resolve_template(EX22_S1, _RNG, 0, 0) + resolve_template(EX22_S2, _RNG, 1, 0)
    return pd.DataFrame(rows, columns=[f.name for f in TOKEN_SCHEMA.fields])


def ex22_tokens(spark: SparkSession) -> DataFrame:
    return spark.createDataFrame(ex22_rows(), schema=TOKEN_SCHEMA)
