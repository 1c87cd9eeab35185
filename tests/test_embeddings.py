"""Embedding substrate tests: cluster geometry, expansion semantics."""
import pytest

from repro.nlp import embeddings


class TestSimilarity:
    def test_identity(self):
        assert embeddings.similarity("coffee", "coffee") == 1.0

    def test_case_insensitive_identity(self):
        assert embeddings.similarity("Coffee", "coffee") == 1.0

    def test_intra_cluster_high(self):
        assert embeddings.similarity("serves", "sells") > 0.5
        assert embeddings.similarity("coffee", "espresso") > 0.5
        assert embeddings.similarity("beijing", "city") > 0.5
        assert embeddings.similarity("china", "country") > 0.5

    def test_cross_cluster_low(self):
        assert embeddings.similarity("beijing", "country") < 0.4
        assert embeddings.similarity("china", "city") < 0.4
        assert embeddings.similarity("coffee", "barista") < 0.5

    def test_ex22_discrimination(self):
        # Example 2.2: city-entities answer "city", country-entities "country".
        for gpe in ("beijing", "tokyo"):
            assert embeddings.similarity(gpe, "city") > embeddings.similarity(gpe, "country")
        for gpe in ("china", "japan"):
            assert embeddings.similarity(gpe, "country") > embeddings.similarity(gpe, "city")

    def test_deterministic(self):
        assert embeddings.similarity("serves", "pours") == embeddings.similarity(
            "serves", "pours"
        )

    def test_range(self):
        assert 0.0 <= embeddings.similarity("dog", "espresso") <= 1.0


class TestExpand:
    def test_original_first(self):
        exp = embeddings.expand("serves coffee")
        assert exp[0] == ("serves coffee", 1.0)

    def test_recovers_paraphrases(self):
        phrases = dict(embeddings.expand("serves coffee", k=30))
        assert "sells espresso" in phrases
        assert phrases["sells espresso"] > 0.3

    def test_scores_sorted_descending(self):
        exp = embeddings.expand("employs baristas", k=12)
        scores = [s for _, s in exp]
        assert scores == sorted(scores, reverse=True)

    def test_k_limits(self):
        assert len(embeddings.expand("serves coffee", k=4)) == 4

    def test_single_word(self):
        exp = dict(embeddings.expand("coffee", k=8))
        assert "espresso" in exp

    def test_unknown_word_only_self(self):
        exp = embeddings.expand("zzyzx", k=5)
        assert exp[0] == ("zzyzx", 1.0)
