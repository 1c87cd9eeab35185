"""Fig. 6 analogue — index construction time and materialized size for
the four schemes on a fixed wiki-lite corpus.

Paper's shape: INVERTED ≈ ADVINVERTED build fastest, KOKO somewhat
slower (hierarchy construction), SUBTREE ≥ 2× slower than KOKO; KOKO has
the smallest footprint, SUBTREE the largest (several × the corpus).
Size lands in ``extra_info["size_mb"]``.
"""
import pytest

from repro.corpus import generator
from repro.indexing import stats

N_DOCS = 400


@pytest.fixture(scope="module")
def tokens(spark):
    t = generator.wiki_corpus(spark, N_DOCS, seed=23)
    t.cache().count()
    return t


@pytest.mark.parametrize("scheme", stats.SCHEMES)
def test_index_construction(benchmark, tokens, scheme):
    holder = {}

    def run():
        holder["r"] = stats.build_report(scheme, tokens)

    benchmark.pedantic(run, rounds=1, iterations=1, warmup_rounds=0)
    r = holder["r"]
    benchmark.extra_info["table"] = "F6"
    benchmark.extra_info["setting"] = f"{scheme}/{N_DOCS}docs"
    benchmark.extra_info["build_seconds"] = round(r.build_seconds, 3)
    benchmark.extra_info["size_mb"] = round(r.size_bytes / 1e6, 3)
    benchmark.extra_info["n_rows"] = r.n_rows
