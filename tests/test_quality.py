"""§6.1 extraction-quality reproduction tests (Figs. 3–5 + NELL).

These assert the paper's *shape* claims on the synthetic cafe corpus:
KOKO's F1 beats IKE and CRF at its best threshold, precision rises and
recall falls with the threshold, descriptors matter for short-doc
(barista) corpora but not long-doc (sprudge), NELL has high precision
and collapsed recall, and tweets (1-sentence docs) close the gap.
"""
import pandas as pd
import pytest

from repro.bench import quality
from repro.bench.metrics import prf
from repro.corpus import cafes

THRESHOLDS = [0.2, 0.4, 0.6, 0.8]


@pytest.fixture(scope="module")
def barista(spark):
    qc = cafes.cafe_corpus(spark, 84, style="barista", seed=3)
    qc.tokens.cache().count()
    return qc


@pytest.fixture(scope="module")
def sprudge(spark):
    qc = cafes.cafe_corpus(spark, 150, style="sprudge", seed=4)
    qc.tokens.cache().count()
    return qc


@pytest.fixture(scope="module")
def barista_sweep(barista):
    return quality.sweep_koko(barista, THRESHOLDS)


class TestKokoCurve:
    def test_precision_rises_with_threshold(self, barista_sweep):
        p = list(barista_sweep.precision)
        assert p[0] <= p[-1]
        assert p[-1] > 0.9

    def test_recall_falls_with_threshold(self, barista_sweep):
        r = list(barista_sweep.recall)
        assert r[0] >= r[-1]
        assert r[0] > 0.9

    def test_f1_peak_interior(self, barista_sweep):
        f1 = list(barista_sweep.f1)
        assert max(f1[1:3]) >= max(f1[0], f1[3])


class TestKokoVsBaselines:
    def test_beats_ike(self, barista, barista_sweep):
        ike_m = quality.run_ike(barista)
        assert barista_sweep.f1.max() > ike_m.f1

    def test_beats_crf(self, barista, barista_sweep):
        crf_m = quality.run_crf(barista)
        assert barista_sweep.f1.max() > crf_m.f1

    def test_precision_factor_vs_ike(self, barista, barista_sweep):
        """Abstract: up to 3× better precision than other techniques."""
        ike_m = quality.run_ike(barista)
        best_p = barista_sweep.precision.max()
        assert best_p / max(ike_m.precision, 1e-9) > 1.5


class TestNELL:
    def test_high_precision_low_recall(self, barista):
        m = quality.run_nell(barista)
        assert m.recall < 0.2          # paper: 0.04–0.05
        if m.n_pred:
            assert m.precision > 0.5   # paper: 0.27–0.7


class TestDescriptors:
    """Fig. 5: descriptors help the short-doc corpus, not the long-doc one."""

    def test_barista_descriptors_help(self, barista):
        with_d = quality.sweep_koko(barista, [0.6]).f1.iloc[0]
        without = quality.sweep_koko(barista, [0.6], with_descriptors=False).f1.iloc[0]
        assert with_d > without + 0.1

    def test_sprudge_descriptors_marginal(self, sprudge):
        with_d = quality.sweep_koko(sprudge, [0.6]).f1.iloc[0]
        without = quality.sweep_koko(sprudge, [0.6], with_descriptors=False).f1.iloc[0]
        assert abs(with_d - without) < 0.1


class TestTweets:
    """Fig. 4: 1-sentence docs — aggregation can't be exploited, baselines
    get closer to KOKO than on the cafe task."""

    @pytest.fixture(scope="class")
    def tweets(self, spark):
        qc = cafes.tweet_corpus(spark, 250, target="facility", seed=6)
        qc.tokens.cache().count()
        return qc

    def test_koko_extracts_facilities(self, tweets):
        pred = quality.koko_predictions(tweets.tokens, 0.4, target="facility")
        m = prf(pred, tweets.truth)
        assert m.f1 > 0.5

    def test_gap_narrows(self, barista, tweets):
        cafe_gap = (
            quality.sweep_koko(barista, [0.6]).f1.iloc[0]
            - quality.run_ike(barista).f1
        )
        tweet_koko = prf(
            quality.koko_predictions(tweets.tokens, 0.4, target="facility"),
            tweets.truth,
        ).f1
        tweet_ike = quality.run_ike(tweets, target="facility").f1
        assert (tweet_koko - tweet_ike) < cafe_gap + 0.05
