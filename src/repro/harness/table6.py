"""Table 6 / Sec. 5.5 harness: the image-search application.

Pipeline per the paper: every query-image descriptor runs a k=100 kANN
search at the descriptor level; Borda count (Eq. 7) aggregates descriptor
results into an image ranking; the top-5 images are compared — via MAP@5 —
against the ground-truth ranking produced by the *linear scan* descriptor
search. Paper outcome (Yorck): HD-Index 0.6, QALSH 0.6, SRS 0.19, C2LSH 0.0.
"""
from __future__ import annotations

import time

import numpy as np
import pandas as pd
from pyspark.sql import SparkSession

from repro.baselines.linear_scan import knn_linear_scan
from repro.harness.datasets import DatasetSpec
from repro.harness.table5 import run_method
from repro.imagesearch.borda import borda_counts, top_images
from repro.imagesearch.dataset import ImageCollection, make_image_collection
from repro.metrics import map_at_k
from repro.synth_data import vectors_df

__all__ = ["run_image_search", "format_table6"]

IMG_METHODS = ["hdindex", "qalsh", "srs", "c2lsh"]


def _spec_for(col: ImageCollection, lo: float, hi: float) -> DatasetSpec:
    n = len(col.X)
    return DatasetSpec(
        name="imagesearch",
        paper_name="Yorck",
        nu=col.X.shape[1],
        n=n,
        paper_n=15_120_935,
        lo=lo,
        hi=hi,
        integer=False,
        n_queries=len(col.queries),
        tau=4,
        omega=8,
        alpha=min(2048, n),
        seed=0,
    )


def run_image_search(
    spark: SparkSession,
    *,
    methods: list[str] | None = None,
    k_desc: int = 100,
    k_img: int = 5,
    collection: ImageCollection | None = None,
) -> dict:
    """Image-level MAP@k_img per method vs the linear-scan Borda ranking."""
    methods = methods or IMG_METHODS
    # Overlapping images (large spread) + noisy queries: descriptor search
    # must resolve fine structure, so approximate descriptor errors cascade
    # into the image ranking — the regime the paper's Yorck experiment
    # demonstrates (see make_image_collection docstring).
    col = collection or make_image_collection(
        n_images=300, descs_per_image=20, nu=64, n_query_images=8,
        image_spread=0.25, noise=0.05, seed=0,
    )
    lo, hi = -1.0, 1.0
    spec = _spec_for(col, lo, hi)
    df = vectors_df(spark, col.X).persist()
    df.count()

    # ground truth: Borda over exact descriptor kANN
    exact = knn_linear_scan(df, col.queries, k_desc)
    bc_true = borda_counts(spark, exact, col.desc_image, col.query_image, k_desc)
    truth_top = top_images(bc_true, k_img)

    out = {"collection": col, "k_desc": k_desc, "k_img": k_img, "methods": {}}
    for m in methods:
        res, b_s, q_s = run_method(spark, m, df, col.X, col.queries, spec, k_desc)
        bc = borda_counts(spark, res, col.desc_image, col.query_image, k_desc)
        mine_top = top_images(bc, k_img)
        # align lengths (a method may miss a query image entirely)
        mine_top += [[]] * (len(truth_top) - len(mine_top))
        mp = map_at_k(mine_top, truth_top, k_img)
        hit_source = np.mean(
            [
                col.query_source[qi] in mine_top[qi][:1]
                for qi in range(len(truth_top))
            ]
        )
        out["methods"][m] = {
            "map_img": mp,
            "top1_is_source_image": float(hit_source),
            "build_s": b_s,
            "query_s": q_s,
        }
    df.unpersist()
    return out


def format_table6(run: dict) -> str:
    paper = {"hdindex": 0.6, "qalsh": 0.6, "srs": 0.19, "c2lsh": 0.0}
    lines = [
        f"== Image search (Borda count, k_desc={run['k_desc']}, "
        f"top-{run['k_img']} images) =="
    ]
    for m, r in run["methods"].items():
        p = paper.get(m)
        ptxt = f"{p:.2f}" if p is not None else "  — "
        lines.append(
            f"  {m:12} MAP@{run['k_img']} images: paper {ptxt}  ours {r['map_img']:.2f}   "
            f"top1=source {r['top1_is_source_image']:.2f}   query {r['query_s']:.1f}s"
        )
    return "\n".join(lines)
