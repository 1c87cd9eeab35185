"""Figs. 7/8 analogue — DPLI lookup time & effectiveness per scheme over
the SyntheticTree benchmark.

Usage: python jobs/index_lookup.py [--docs 150] [--queries 40]
"""
from __future__ import annotations

import argparse
import sys

sys.path.insert(0, "jobs")
from _common import session  # noqa: E402

from repro.bench import lookup, synthetic_tree
from repro.corpus import generator
from repro.indexing import advinverted, inverted, koko_index, subtree


def main() -> None:
    ap = argparse.ArgumentParser()
    ap.add_argument("--docs", type=int, default=150)
    ap.add_argument("--queries", type=int, default=40)
    args = ap.parse_args()
    spark = session("index_lookup")
    tokens = generator.wiki_corpus(spark, args.docs, seed=29)
    tokens.cache().count()
    qs = synthetic_tree.benchmark(tokens, seed=0)
    sample = qs[:: max(1, len(qs) // args.queries)][: args.queries]
    truths = {q.name: lookup.ground_truth(tokens, q) for q in sample}
    indices = {
        "koko": koko_index.build(tokens).cache(),
        "inverted": inverted.build(tokens).cache(),
        "advinverted": advinverted.build(tokens).cache(),
        "subtree": subtree.build(tokens).cache(),
    }
    print(f"{'scheme':<12} {'supported':>9} {'mean_s':>8} {'mean_eff':>9}")
    for scheme, idx in indices.items():
        res = [lookup.run_lookup(scheme, idx, tokens, q, truths[q.name]) for q in sample]
        ok = [r for r in res if r.supported]
        nonempty = [r for r in ok if r.n_returned > 0]
        mean_s = sum(r.seconds for r in ok) / max(1, len(ok))
        mean_eff = sum(r.effectiveness for r in nonempty) / max(1, len(nonempty))
        print(f"{scheme:<12} {len(ok):>9} {mean_s:>8.3f} {mean_eff:>9.3f}")
    spark.stop()


if __name__ == "__main__":
    main()
