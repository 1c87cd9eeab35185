"""Fig. 6 analogue — index construction time & size for the four schemes
across corpus sizes, plus the §3 hierarchy-compression ratio.

Usage: python jobs/index_construction.py [--sizes 100,400,1600]
"""
from __future__ import annotations

import argparse
import sys

sys.path.insert(0, "jobs")
from _common import session  # noqa: E402

from repro.corpus import generator
from repro.indexing import koko_index, stats


def main() -> None:
    ap = argparse.ArgumentParser()
    ap.add_argument("--sizes", default="100,400,1600")
    args = ap.parse_args()
    spark = session("index_construction")
    print(f"{'docs':>6} {'scheme':<12} {'build_s':>8} {'size_MB':>8} {'rows':>10}")
    for n in [int(s) for s in args.sizes.split(",")]:
        tokens = generator.wiki_corpus(spark, n, seed=23)
        tokens.cache().count()
        for scheme in stats.SCHEMES:
            r = stats.build_report(scheme, tokens)
            print(
                f"{n:>6} {scheme:<12} {r.build_seconds:>8.2f} "
                f"{r.size_bytes / 1e6:>8.2f} {r.n_rows:>10}"
            )
        comp = koko_index.compression_stats(tokens, koko_index.build(tokens))
        print(
            f"{n:>6} {'(compress)':<12} PL {comp['pl_reduction']:.4%} "
            f"POS {comp['pos_reduction']:.4%} of {int(comp['n_tree_nodes'])} nodes"
        )
        tokens.unpersist()
    spark.stop()


if __name__ == "__main__":
    main()
