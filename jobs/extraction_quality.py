"""Figs. 3/4 + NELL — extraction quality: KOKO (threshold sweep) vs IKE,
CRF, NELL on cafe blogs or tweets.

Usage: python jobs/extraction_quality.py [--style barista|sprudge|tweets]
                                         [--docs 84]
"""
from __future__ import annotations

import argparse
import sys

sys.path.insert(0, "jobs")
from _common import session  # noqa: E402

from repro.bench import quality
from repro.bench.metrics import prf
from repro.corpus import cafes

THRESHOLDS = [0.2, 0.3, 0.4, 0.5, 0.6, 0.7, 0.8, 0.9]


def main() -> None:
    ap = argparse.ArgumentParser()
    ap.add_argument("--style", default="barista",
                    choices=["barista", "sprudge", "tweets"])
    ap.add_argument("--docs", type=int, default=0)
    args = ap.parse_args()
    spark = session("extraction_quality")
    if args.style == "tweets":
        qc = cafes.tweet_corpus(spark, args.docs or 250, target="facility", seed=6)
        target = "facility"
    else:
        n = args.docs or (84 if args.style == "barista" else 400)
        qc = cafes.cafe_corpus(spark, n, style=args.style, seed=3)
        target = "cafe"
    qc.tokens.cache().count()
    print(f"corpus={args.style} docs={qc.truth.doc_id.nunique()} gold={len(qc.truth)}")
    print(quality.sweep_koko(qc, THRESHOLDS, target=target).to_string(index=False))
    m = quality.run_ike(qc, target=target)
    print(f"IKE   P={m.precision:.3f} R={m.recall:.3f} F1={m.f1:.3f}")
    m = quality.run_crf(qc)
    print(f"CRF   P={m.precision:.3f} R={m.recall:.3f} F1={m.f1:.3f} (held-out half)")
    if target == "cafe":
        m = quality.run_nell(qc)
        print(f"NELL  P={m.precision:.3f} R={m.recall:.3f} F1={m.f1:.3f}")
    spark.stop()


if __name__ == "__main__":
    main()
