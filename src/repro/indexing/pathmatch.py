"""Path-pattern → regex translation for hierarchy-index lookups.

Hierarchy-index nodes are identified by their root-to-node path string
(``/root/dobj/nn``); a KOKO path expression with ``/`` (child), ``//``
(descendant) and ``*`` (any label) becomes an anchored regex over those
strings. The same machinery compiles *combined* patterns over
``label|POS|token`` triple paths for the full-scan reference matcher and
the per-sentence validation step.

Note ``//X`` from the root matches the root itself (the paper's
``a = //verb`` binds the root token "ate"), i.e. "zero or more
intervening elements".
"""
from __future__ import annotations

import re
from dataclasses import dataclass, field

from ..corpus.vocab import classify_label


@dataclass(frozen=True)
class Step:
    """One axis+label step of a path expression.

    ``kind`` is ``parse`` / ``pos`` / ``word`` / ``wildcard`` —
    pre-classified by the AST layer (quoted labels are words).
    ``conds`` holds the bracketed conditions: ``pos``, ``text``,
    ``etype``, ``regex``.
    """
    axis: str  # '/' or '//'
    label: str
    kind: str
    conds: tuple[tuple[str, str], ...] = field(default_factory=tuple)

    def cond(self, key: str) -> str | None:
        for k, v in self.conds:
            if k == key:
                return v
        return None


def parse_path(path: str) -> list[Step]:
    """Parse the paper's path syntax: ``//verb[@text="ate"]/dobj//"delicious"``.

    Bracket conditions accept ``@pos=…``, ``@text=…``, ``@regex=…``,
    ``etype=…`` (comma-separated, values quoted).
    """
    steps: list[Step] = []
    i = 0
    token_re = re.compile(r'("([^"]*)"|\*|[A-Za-z_][A-Za-z0-9_]*)')
    cond_re = re.compile(r'@?(\w+)\s*=\s*"([^"]*)"')
    while i < len(path):
        if path.startswith("//", i):
            axis, i = "//", i + 2
        elif path.startswith("/", i):
            axis, i = "/", i + 1
        else:
            raise ValueError(f"expected axis at {path[i:]!r}")
        m = token_re.match(path, i)
        if not m:
            raise ValueError(f"expected label at {path[i:]!r}")
        raw = m.group(1)
        i = m.end()
        if raw.startswith('"'):
            label, kind = m.group(2), "word"
        else:
            label, kind = raw, classify_label(raw)
        conds: list[tuple[str, str]] = []
        if i < len(path) and path[i] == "[":
            j = path.index("]", i)
            for cm in cond_re.finditer(path[i + 1 : j]):
                conds.append((cm.group(1), cm.group(2)))
            i = j + 1
        steps.append(Step(axis, label, kind, tuple(conds)))
    return steps


def _elem(pattern: str, axis: str) -> str:
    return ("(?:/[^/]+)*/" if axis == "//" else "/") + pattern


def label_path_regex(steps: list[Step], attr: str) -> str | None:
    """Anchored regex for a PL (``attr='parse'``) or POS (``attr='pos'``)
    path string, per §4.2.1: every step whose label is not of this
    attribute becomes ``*``. Returns None when the pattern carries **no**
    constraint at all (pure ``//*`` chain) — callers skip that lookup.
    """
    out, informative = "^", False
    for s in steps:
        if attr == "parse":
            lab = s.label if s.kind == "parse" else None
        else:
            lab = None
            if s.kind == "pos":
                lab = s.label.upper()
            elif s.cond("pos"):
                lab = s.cond("pos").upper()
        if lab is None:
            pat = "[^/]+"
        else:
            pat = re.escape(lab)
            informative = True
        if s.axis == "/":
            informative = True  # child axis constrains depth even via *
        out += _elem(pat, s.axis)
    return out + "$" if informative else None


def word_path_words(steps: list[Step]) -> list[tuple[int, str]]:
    """(step index, word) for every step that constrains the token text —
    quoted labels and ``@text`` conditions (Example 4.2)."""
    out = []
    for i, s in enumerate(steps):
        if s.kind == "word":
            out.append((i, s.label))
        elif s.cond("text"):
            out.append((i, s.cond("text")))
    return out


def gap(steps: list[Step], i: int, j: int) -> tuple[int, bool]:
    """(min depth gap, exact?) between step i and step j (i < j): each
    step is ≥1 level; exact iff no ``//`` axis in between."""
    seg = steps[i + 1 : j + 1]
    return len(seg), all(s.axis == "/" for s in seg)


def triple_path_regex(steps: list[Step]) -> str:
    """Anchored regex over ``label|POS|token`` triple paths enforcing every
    step's full condition set simultaneously (exact matching)."""
    out = "^"
    for s in steps:
        lbl = re.escape(s.label) if s.kind == "parse" else r"[^/|]*"
        pos = r"[^/|]*"
        if s.kind == "pos":
            pos = re.escape(s.label.upper())
        elif s.cond("pos"):
            pos = re.escape(s.cond("pos").upper())
        word = r"[^/|]*"
        if s.kind == "word":
            word = re.escape(s.label)
        elif s.cond("text"):
            word = re.escape(s.cond("text"))
        elif s.cond("regex"):
            word = f"(?:{s.cond('regex')})"
        out += _elem(f"{lbl}\\|{pos}\\|{word}", s.axis)
    return out + "$"
