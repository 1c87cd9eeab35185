"""Figs. 7/8 analogue — DPLI index lookup time and effectiveness over a
SyntheticTree sample for the four schemes.

Paper's shape: KOKO and SUBTREE lookups are much faster than
(ADV)INVERTED (≥7× KOKO vs prior schemes); KOKO and ADVINVERTED are
near-perfectly effective, SUBTREE ~0.6+, INVERTED <0.5. SUBTREE supports
only the wildcard-free, word-free subset (125/350 in the paper).
``extra_info`` carries mean lookup seconds, mean effectiveness, and the
supported-query count.
"""
import pytest

from repro.bench import lookup, synthetic_tree
from repro.corpus import generator
from repro.indexing import advinverted, inverted, koko_index, subtree

N_DOCS = 150
N_QUERIES = 16


@pytest.fixture(scope="module")
def setup(spark):
    tokens = generator.wiki_corpus(spark, N_DOCS, seed=29)
    tokens.cache().count()
    queries = synthetic_tree.benchmark(tokens, seed=0)
    sample = queries[:: max(1, len(queries) // N_QUERIES)][:N_QUERIES]
    truths = {q.name: lookup.ground_truth(tokens, q) for q in sample}
    indices = {
        "koko": koko_index.build(tokens).cache(),
        "inverted": inverted.build(tokens).cache(),
        "advinverted": advinverted.build(tokens).cache(),
        "subtree": subtree.build(tokens).cache(),
    }
    return tokens, sample, truths, indices


@pytest.mark.parametrize("scheme", ["koko", "inverted", "advinverted", "subtree"])
def test_dpli_lookup(benchmark, setup, scheme):
    tokens, sample, truths, indices = setup
    holder = {}

    def run():
        holder["res"] = [
            lookup.run_lookup(scheme, indices[scheme], tokens, q, truths[q.name])
            for q in sample
        ]

    benchmark.pedantic(run, rounds=1, iterations=1, warmup_rounds=0)
    res = [r for r in holder["res"] if r.supported]
    nonempty = [r for r in res if r.n_returned > 0]
    benchmark.extra_info["table"] = "F7/F8"
    benchmark.extra_info["setting"] = f"{scheme}/{N_DOCS}docs/{len(sample)}q"
    benchmark.extra_info["supported"] = len(res)
    benchmark.extra_info["mean_lookup_s"] = round(
        sum(r.seconds for r in res) / max(1, len(res)), 4
    )
    benchmark.extra_info["mean_effectiveness"] = round(
        sum(r.effectiveness for r in nonempty) / max(1, len(nonempty)), 4
    )
