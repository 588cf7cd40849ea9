"""Table 2 harness: the paper's running example.

Recomputes the Hilbert-key ranks (HK1 over dims 1-2, HK2 over dims 3-4,
omega=2) of the 8 example objects and prints them next to the published
values. Our curve matches all of HK1 and 7/8 of HK2; the divergent entry
(O2, HK2) is inconsistent in the paper — O2 and O3 share a grid cell, so
their keys must tie (DESIGN.md deviation #4).
"""
from __future__ import annotations

import numpy as np

from repro.hilbert.curve import hilbert_keys, quantize, rank_along_curve

OBJECTS = {
    "O1": (0.20, 0.74, 0.68, 0.73),
    "O2": (0.84, 0.34, 0.49, 0.81),
    "O3": (0.97, 0.64, 0.32, 0.93),
    "O4": (0.42, 0.86, 0.12, 0.82),
    "O5": (0.62, 0.09, 0.56, 0.07),
    "O6": (0.84, 0.59, 0.49, 0.73),
    "O7": (0.05, 0.43, 0.52, 0.82),
    "O8": (0.40, 0.24, 0.10, 0.64),
}
PAPER_HK = {
    "O1": (3, 5), "O2": (6, 5), "O3": (5, 3), "O4": (4, 2),
    "O5": (7, 7), "O6": (5, 4), "O7": (2, 6), "O8": (1, 1),
}
OMEGA = 2


def compute_table2() -> list[dict]:
    """Rows: object, dims, paper HK1/HK2, our HK1/HK2."""
    names = list(OBJECTS)
    vals = np.array([OBJECTS[o] for o in names])
    ranks = []
    for dim_slice in ((0, 2), (2, 4)):
        cells = quantize(vals[:, dim_slice[0] : dim_slice[1]], 0.0, 1.0, OMEGA)
        ranks.append(rank_along_curve(hilbert_keys(cells, OMEGA)))
    return [
        {
            "object": o,
            "dims": OBJECTS[o],
            "paper_hk1": PAPER_HK[o][0],
            "paper_hk2": PAPER_HK[o][1],
            "ours_hk1": int(ranks[0][i]),
            "ours_hk2": int(ranks[1][i]),
        }
        for i, o in enumerate(names)
    ]


def print_table2() -> None:
    rows = compute_table2()
    print(f"{'Obj':4} {'coordinates':28} {'HK1 paper/ours':>16} {'HK2 paper/ours':>16}")
    for r in rows:
        coords = " ".join(f"{v:.2f}" for v in r["dims"])
        print(
            f"{r['object']:4} {coords:28} "
            f"{r['paper_hk1']:>7}/{r['ours_hk1']:<7} "
            f"{r['paper_hk2']:>7}/{r['ours_hk2']:<7}"
        )


if __name__ == "__main__":
    print_table2()
