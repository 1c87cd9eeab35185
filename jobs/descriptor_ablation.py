"""Fig. 5 — KOKO with vs without descriptor expansion, per corpus style.

Usage: python jobs/descriptor_ablation.py [--threshold 0.6]
"""
from __future__ import annotations

import argparse
import sys

sys.path.insert(0, "jobs")
from _common import session  # noqa: E402

from repro.bench import quality
from repro.corpus import cafes


def main() -> None:
    ap = argparse.ArgumentParser()
    ap.add_argument("--threshold", type=float, default=0.6)
    args = ap.parse_args()
    spark = session("descriptor_ablation")
    for style, n in (("barista", 84), ("sprudge", 400)):
        qc = cafes.cafe_corpus(spark, n, style=style, seed=3)
        qc.tokens.cache().count()
        w = quality.sweep_koko(qc, [args.threshold]).iloc[0]
        wo = quality.sweep_koko(qc, [args.threshold], with_descriptors=False).iloc[0]
        print(
            f"{style:<8} with-desc F1={w.f1:.3f}  no-desc F1={wo.f1:.3f}  Δ={w.f1 - wo.f1:+.3f}"
        )
        qc.tokens.unpersist()
    spark.stop()


if __name__ == "__main__":
    main()
