"""Synthetic multi-descriptor image collection for the Sec. 5.5 experiment.

The paper's Yorck application searches SURF descriptors of art images and
aggregates descriptor-level kANN into image-level retrieval by Borda count.
Offline we synthesise: each image is a Gaussian cluster in descriptor space
and contributes several descriptors; a query image is a noisy re-draw of a
database image's descriptor cloud. Ground truth image ranking comes from
running the same Borda aggregation over *exact* (linear-scan) descriptor
kANN — mirroring the paper, where linear scan produces the ground truth.
"""
from __future__ import annotations

from dataclasses import dataclass

import numpy as np

__all__ = ["ImageCollection", "make_image_collection"]


@dataclass
class ImageCollection:
    X: np.ndarray  # (n_desc, nu) all database descriptors, stacked
    desc_image: np.ndarray  # (n_desc,) image id of every descriptor
    queries: np.ndarray  # (n_qdesc, nu) query descriptors, stacked
    query_image: np.ndarray  # (n_qdesc,) query-image id of each query descriptor
    query_source: np.ndarray  # (n_qimages,) database image each query derives from
    n_images: int


def make_image_collection(
    *,
    n_images: int = 60,
    descs_per_image: int = 24,
    nu: int = 32,
    n_query_images: int = 8,
    lo: float = -1.0,
    hi: float = 1.0,
    noise: float = 0.02,
    image_spread: float = 0.05,
    seed: int = 0,
) -> ImageCollection:
    """Images are descriptor clusters; queries are noisy re-draws of randomly
    chosen database images' descriptor sets. ``image_spread`` (fraction of
    the domain width) controls how much images overlap in descriptor space:
    large values make descriptor search genuinely hard, which is what lets
    descriptor-level errors cascade into the image ranking (the paper's
    §5.5 point)."""
    rng = np.random.default_rng(seed)
    width = hi - lo
    centers = rng.uniform(lo + 0.1 * width, hi - 0.1 * width, size=(n_images, nu))
    spread = image_spread * width
    X = np.vstack(
        [c + rng.normal(0, spread, size=(descs_per_image, nu)) for c in centers]
    )
    desc_image = np.repeat(np.arange(n_images), descs_per_image)

    src = rng.choice(n_images, size=n_query_images, replace=False)
    q_descs, q_img = [], []
    for qi, img in enumerate(src):
        base = X[desc_image == img]
        pick = rng.choice(len(base), size=len(base), replace=False)
        q = base[pick] + rng.normal(0, noise * width, size=base.shape)
        q_descs.append(np.clip(q, lo, hi))
        q_img.extend([qi] * len(base))
    return ImageCollection(
        X=np.clip(X, lo, hi),
        desc_image=desc_image,
        queries=np.vstack(q_descs),
        query_image=np.asarray(q_img, dtype=np.int64),
        query_source=src.astype(np.int64),
        n_images=n_images,
    )
