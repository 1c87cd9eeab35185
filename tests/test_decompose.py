"""Clause decomposition tests."""
from repro.corpus import fixtures
from repro.nlp import decompose


def fig1_heads_labels():
    tpl = fixtures.FIG1
    return [t.head for t in tpl.tokens], [t.label for t in tpl.tokens]


class TestClauses:
    def test_simple_sentence_single_clause(self):
        # "The cat sat ." — no clause boundaries.
        cl = decompose.clauses([1, 2, -1, 2], ["det", "nsubj", "root", "punct"])
        assert cl == [([0, 1, 2, 3], 1.0)]

    def test_fig1_three_clauses(self):
        heads, labels = fig1_heads_labels()
        cl = decompose.clauses(heads, labels)
        # root clause, rcmod("was delicious"), conj("also ate a pie")
        assert len(cl) == 3

    def test_fig1_clause_contents(self):
        heads, labels = fig1_heads_labels()
        cl = dict((min(tids), set(tids)) for tids, _ in decompose.clauses(heads, labels))
        # rcmod clause: which(7) was(8) delicious(9)
        assert cl[7] == {7, 8, 9}
        # conj clause: also(12) ate(13) a(14) pie(15)
        assert cl[12] == {12, 13, 14, 15}
        # root clause holds the rest
        assert cl[0] == {0, 1, 2, 3, 4, 5, 6, 10, 11, 16}

    def test_partition(self):
        heads, labels = fig1_heads_labels()
        all_tids = sorted(t for tids, _ in decompose.clauses(heads, labels) for t in tids)
        assert all_tids == list(range(len(heads)))

    def test_weights_are_one(self):
        heads, labels = fig1_heads_labels()
        assert all(w == 1.0 for _, w in decompose.clauses(heads, labels))

    def test_conj_splits(self):
        # "Portland produces and sells the best coffee ."
        heads = [1, -1, 1, 1, 6, 6, 3, 1]
        labels = ["nsubj", "root", "cc", "conj", "det", "amod", "dobj", "punct"]
        cl = dict((min(tids), set(tids)) for tids, _ in decompose.clauses(heads, labels))
        assert cl[3] == {3, 4, 5, 6}  # "sells the best coffee"
        assert 0 in cl[0] and 1 in cl[0]
