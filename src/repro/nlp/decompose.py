"""Sentence decomposition into canonical clauses (§4.4.1(b) substitute).

The paper uses the Stanford OpenIE clause segmenter (stage 1 only): split
each sentence into canonical clauses so descriptor signals are summed over
individual clauses rather than diluted by the whole sentence. We segment
on clause-introducing parse labels of the dependency tree: every token
whose label is in ``CLAUSE_LABELS`` (plus the root) heads a clause; a
clause's tokens are its head's subtree minus any nested clause subtrees.

Returns ``C = [(clause_tids, l_j)]`` with ``l_j = 1.0`` (the substitute
segmenter is exact on our trees, so clause confidence is uniform).
"""
from __future__ import annotations

from typing import Sequence

CLAUSE_LABELS = frozenset({"conj", "rcmod", "acl", "relcl", "xcomp", "advcl"})


def clauses(
    heads: Sequence[int], labels: Sequence[str]
) -> list[tuple[list[int], float]]:
    n = len(heads)
    clause_heads = [i for i in range(n) if heads[i] == -1 or labels[i] in CLAUSE_LABELS]
    # Assign every token to the nearest clause-head ancestor (or itself).
    owner = [-1] * n
    head_set = set(clause_heads)
    for i in range(n):
        j = i
        while j not in head_set and heads[j] != -1:
            j = heads[j]
        owner[i] = j
    out = []
    for h in clause_heads:
        tids = sorted(i for i in range(n) if owner[i] == h)
        out.append((tids, 1.0))
    return out
