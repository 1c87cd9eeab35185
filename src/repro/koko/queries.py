"""The paper's concrete queries, expressed in the AST.

Includes Example 2.1, Example 2.2 (Q1/Q2), the three §6.3 scalability
queries (Chocolate / Title / DateOfBirth), and the Appendix A queries for
cafe names (Fig. 9), facilities (Fig. 10) and sports teams (Fig. 11).

Weights for the cafe query follow the Appendix's structure (certain
patterns weight 1; descriptor groups lower) but are renormalized (their
footnote 4: only relative values matter) so that descriptor-only cafes
with a handful of evidence mentions land mid-scale — giving the threshold
sweep of Fig. 3 its shape on our corpus.
"""
from __future__ import annotations

from .ast import (
    Constraint, Excluding, NodeDef, Query, SatCond, Satisfying, SpanDef,
    elastic, parse_path, subtree, var_atom,
)


def example_21() -> Query:
    """Example 2.1: (e, d) pairs via //verb/dobj//"delicious"."""
    return Query(
        outputs=[("e", "Entity"), ("d", "Str")],
        node_defs=[
            NodeDef("a", None, parse_path("//verb")),
            NodeDef("b", "a", parse_path("/dobj")),
            NodeDef("c", "b", parse_path('//"delicious"')),
        ],
        span_defs=[SpanDef("d", [subtree("b")])],
        constraints=[Constraint("in", "b", "e")],
    )


def example_22(descriptor: str) -> Query:
    """Example 2.2's Q1 (descriptor='city') / Q2 (descriptor='country')."""
    return Query(
        outputs=[("a", "GPE")],
        satisfying=[
            Satisfying("a", [SatCond("similar_to", descriptor, 1.0)], threshold=0.5)
        ],
    )


def chocolate() -> Query:
    """§6.3 'Chocolate' (low selectivity): chocolate types."""
    return Query(
        outputs=[("c", "Entity")],
        node_defs=[
            NodeDef("v", None, parse_path("//verb")),
            NodeDef("o", "v", parse_path('/pobj[@text="chocolate"]')),
            NodeDef("s", "v", parse_path("/nsubj")),
        ],
        constraints=[Constraint("in", "s", "c")],
        satisfying=[
            Satisfying("v", [SatCond("similar_to", "is", 1.0)], threshold=0.8)
        ],
    )


def title() -> Query:
    """§6.3 'Title' (medium selectivity): people's titles/nicknames."""
    return Query(
        outputs=[("a", "Person"), ("b", "Str")],
        node_defs=[
            NodeDef("v", None, parse_path('//"called"')),
            NodeDef("p", "v", parse_path("/propn")),
        ],
        span_defs=[
            SpanDef("b", [subtree("p")]),
            SpanDef("c", [var_atom("a"), elastic(), var_atom("v"), elastic(), var_atom("b")]),
        ],
    )


def date_of_birth() -> Query:
    """§6.3 'DateOfBirth' (high selectivity): people and their DOB."""
    return Query(
        outputs=[("a", "Person"), ("b", "Date")],
        node_defs=[NodeDef("v", None, parse_path("//verb"))],
        satisfying=[
            Satisfying("v", [SatCond("similar_to", "born", 1.0)], threshold=0.8)
        ],
    )


def cafe(threshold: float, with_descriptors: bool = True) -> Query:
    """Appendix Fig. 9: extract cafe names by aggregating evidence.

    Weight groups: certain patterns 1.0; 'more-likely' descriptors 0.25;
    'less-likely' descriptors 0.18 (renormalized, see module docstring).
    """
    conds = [
        SatCond("contains", "Cafe", 1.0),
        SatCond("contains", "Coffee", 1.0),
        SatCond("contains", "Roasters", 1.0),
        SatCond("precedes", "cafe called", 1.0),
        SatCond("near", ", a cafe", 1.0),
    ]
    if with_descriptors:
        conds += [
            SatCond("desc_right", "serves coffee", 0.25),
            SatCond("desc_right", "sells coffee", 0.25),
            SatCond("desc_right", "employs baristas", 0.18),
            SatCond("desc_right", "hired barista", 0.18),
        ]
    return Query(
        outputs=[("x", "Entity")],
        satisfying=[Satisfying("x", conds, threshold=threshold)],
        excluding=Excluding(
            "x",
            [
                SatCond("matches", r"[a-z 0-9.]+"),
                SatCond("matches", r"@[A-Za-z 0-9.]+"),
                SatCond("matches", r"[Cc]offee|[Cc]afe"),
                SatCond("matches", r"[A-Za-z 0-9.]*[Bb]arista [Cc]hampionship"),
                SatCond("matches", r"[A-Za-z 0-9.]*[Bb]rewers [Cc]up"),
                SatCond("matches", r"[A-Za-z 0-9.]*[Ff]est(ival)?"),
                SatCond("matches", r"[L1]a Marzocco"),
                SatCond("matches", r"[Ss]ynesso"),
                SatCond("matches", r"[Aa]eropress"),
                SatCond("matches", r"[Vv]60"),
                SatCond("matches", r"[0-9]+ [0-9A-Za-z ]+ [Ss]t.?"),
                SatCond("matches", r"[0-9]+ [0-9A-Za-z ]+ [Aa]ve.?"),
                SatCond("in_dict", "Location"),
            ],
        ),
    )


def facility(threshold: float) -> Query:
    """Appendix Fig. 10: facilities from tweets."""
    return Query(
        outputs=[("x", "Entity")],
        satisfying=[
            Satisfying(
                "x",
                [
                    SatCond("precedes", "at", 1.0),
                    SatCond("desc_left", "went to", 0.8),
                    SatCond("desc_left", "go to", 0.8),
                ],
                threshold=threshold,
            )
        ],
        excluding=Excluding(
            "x",
            [
                SatCond("contains", "p.m."),
                SatCond("contains", "a.m."),
                SatCond("contains", "pm"),
                SatCond("contains", "am"),
                SatCond("mentions", "@"),
                SatCond("contains", "today"),
                SatCond("contains", "tomorrow"),
                SatCond("contains", "tonight"),
            ],
        ),
    )


def team(threshold: float) -> Query:
    """Appendix Fig. 11: sports teams from tweets."""
    return Query(
        outputs=[("x", "Entity")],
        satisfying=[
            Satisfying(
                "x",
                [
                    SatCond("precedes", "Go", 1.0),
                    SatCond("follows", "won", 0.8),
                    SatCond("near", "game", 0.6),
                ],
                threshold=threshold,
            )
        ],
    )
