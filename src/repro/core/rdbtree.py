"""Distributed RDB-tree: leaf bucketing and the driver-side fence hierarchy.

A paper RDB-tree is a disk B+-tree over Hilbert keys whose leaves hold, per
entry, (hilbert key, object pointer, distances to the m reference objects) —
exactly Omega entries per 4 KB page (Eq. 4). Our distributed realisation
keeps that geometry:

* the **leaf level** is a DataFrame with columns ``(leaf_id, slot, hkey, id,
  rdist)`` where ``(leaf_id, slot)`` comes from the global sort order by
  ``hkey`` bucketed Omega-at-a-time. It is range-partitioned by ``hkey`` so a
  leaf-window scan touches few Spark partitions — the analogue of the
  paper's O(log n + alpha/Omega) page reads;
* the **internal levels** are the per-leaf key fences (min/max key, slot
  count), grouped theta-way bottom-up into a tiny driver-resident hierarchy
  (`FenceHierarchy`). n/Omega fences for n in the millions is a few
  thousand rows — the same observation that lets the paper cache internal
  nodes in RAM.

Global sort positions are computed with the standard distributed-rank idiom:
range partition -> sort within partitions -> per-partition counts -> driver
cumsum of offsets -> offset + local index, avoiding a single-partition window.
"""
from __future__ import annotations

import bisect
from dataclasses import dataclass

import pandas as pd
from pyspark.sql import DataFrame, functions as F
from pyspark.sql.types import LongType, StructField, StructType

__all__ = ["assign_leaves", "leaf_fences", "FenceHierarchy"]


def assign_leaves(
    df: DataFrame, key_col: str, leaf_order: int, *, n_partitions: int | None = None
) -> DataFrame:
    """Bucket rows into RDB-tree leaves of exactly ``leaf_order`` slots.

    Adds ``leaf_id`` (0-based, contiguous in global ``key_col`` order) and
    ``slot`` (position within the leaf). Ties on ``key_col`` are broken by
    ``id`` so the assignment is deterministic.
    """
    if leaf_order < 1:
        raise ValueError("leaf_order must be >= 1")
    sort_cols = [key_col, "id"]
    if n_partitions is None:
        n_partitions = max(2, df.sparkSession.sparkContext.defaultParallelism // 2)
    part = df.repartitionByRange(n_partitions, *sort_cols).sortWithinPartitions(
        *sort_cols
    )
    part = part.withColumn("_pid", F.spark_partition_id())
    # repartitionByRange SAMPLES its boundaries per action; without pinning,
    # the counts pass and the numbering pass below could execute under
    # different partitionings and corrupt the global order. Persist +
    # materialise so both passes read the same physical layout.
    part = part.persist()
    part.count()

    counts = {
        r["_pid"]: r["cnt"]
        for r in part.groupBy("_pid").agg(F.count("*").alias("cnt")).collect()
    }
    offsets: dict[int, int] = {}
    acc = 0
    for pid in sorted(counts):
        offsets[pid] = acc
        acc += counts[pid]

    schema = StructType(
        part.schema.fields
        + [StructField("leaf_id", LongType()), StructField("slot", LongType())]
    )
    b_offsets = df.sparkSession.sparkContext.broadcast(offsets)

    def _number(batches):
        # One partition == one iterator; rows arrive already sorted. Number
        # them from the partition's global offset.
        local = 0
        for pdf in batches:
            if pdf.empty:
                continue
            pid = int(pdf["_pid"].iloc[0])
            start = b_offsets.value[pid] + local
            pos = pd.Series(range(start, start + len(pdf)), index=pdf.index)
            local += len(pdf)
            out = pdf.copy()
            out["leaf_id"] = pos // leaf_order
            out["slot"] = pos % leaf_order
            yield out

    return part.mapInPandas(_number, schema=schema).drop("_pid")


def leaf_fences(tree_df: DataFrame, key_col: str = "hkey") -> pd.DataFrame:
    """Collect per-leaf (min key, max key, slot count) fences to the driver.

    This is the content of the level-1 internal nodes of the RDB-tree; it is
    O(n / Omega) rows and forms the base of :class:`FenceHierarchy`.
    """
    pdf = (
        tree_df.groupBy("leaf_id")
        .agg(
            F.min(key_col).alias("min_key"),
            F.max(key_col).alias("max_key"),
            F.count("*").alias("count"),
        )
        .orderBy("leaf_id")
        .toPandas()
    )
    return pdf.reset_index(drop=True)


@dataclass
class _Level:
    # per node: index of first child in the level below, min/max key
    first_child: list
    min_key: list
    max_key: list


class FenceHierarchy:
    """Driver-side internal levels of one RDB-tree.

    Built theta-way bottom-up over the leaf fences; ``lookup`` descends from
    the root choosing the child whose key range covers (or is nearest to)
    the probe key — the B+-tree root-to-leaf walk of the paper. ``window``
    then widens the hit to a contiguous leaf range holding enough slots for
    the alpha-candidate scan.
    """

    def __init__(self, fences: pd.DataFrame, branching: int):
        if branching < 2:
            raise ValueError("branching must be >= 2")
        if len(fences) == 0:
            raise ValueError("empty fence table")
        if not (fences["leaf_id"].values == range(len(fences))).all():
            raise ValueError("fences must be dense and ordered by leaf_id")
        self.fences = fences.reset_index(drop=True)
        self.branching = branching
        self.counts = fences["count"].to_list()
        self.cum = [0]
        for c in self.counts:
            self.cum.append(self.cum[-1] + c)
        self.levels: list[_Level] = []
        mins = fences["min_key"].to_list()
        maxs = fences["max_key"].to_list()
        while len(mins) > 1:
            fc, lmin, lmax = [], [], []
            for i in range(0, len(mins), branching):
                fc.append(i)
                lmin.append(mins[i])
                lmax.append(maxs[min(i + branching, len(mins)) - 1])
            self.levels.append(_Level(fc, lmin, lmax))
            mins, maxs = lmin, lmax
        self.levels.reverse()  # root first

    @property
    def height(self) -> int:
        """Number of internal levels above the leaves (0 for a single leaf)."""
        return len(self.levels)

    @property
    def n_leaves(self) -> int:
        return len(self.fences)

    @property
    def total_slots(self) -> int:
        return self.cum[-1]

    def lookup(self, key: str) -> int:
        """Leaf id whose key range the probe key falls into (or is nearest).

        Descends the internal levels; within each node's children, picks the
        last child whose min_key <= key (first child if the key precedes
        everything) — identical to a B+-tree separator walk. A final bisect
        over the chosen node's leaf children yields the leaf.
        """
        lo, hi = 0, len(self.levels[0].min_key) if self.levels else self.n_leaves
        for li, level in enumerate(self.levels):
            keys = level.min_key[lo:hi]
            pick = lo + max(0, bisect.bisect_right(keys, key) - 1)
            lo = level.first_child[pick]
            hi = (
                level.first_child[pick + 1]
                if pick + 1 < len(level.first_child)
                else self._level_len(li + 1)
            )
        mins = self.fences["min_key"].to_list()[lo:hi]
        return lo + max(0, bisect.bisect_right(mins, key) - 1)

    def _level_len(self, li: int) -> int:
        if li < len(self.levels):
            return len(self.levels[li].min_key)
        return self.n_leaves

    def lookup_bisect(self, key: str) -> int:
        """Direct bisect over leaf fences — oracle for ``lookup`` in tests."""
        mins = self.fences["min_key"].to_list()
        return max(0, bisect.bisect_right(mins, key) - 1)

    def window(self, leaf_id: int, alpha: int) -> tuple[int, int]:
        """Smallest contiguous leaf range [lo, hi] centred on ``leaf_id`` with
        >= alpha slots on each side of the centre leaf (or hitting the ends).

        Guarantees that the alpha nearest-by-key entries around any key in
        the centre leaf are inside the window.
        """
        lo = hi = leaf_id
        # slots strictly before the centre leaf / strictly after it
        while self.cum[leaf_id] - self.cum[lo] < alpha and lo > 0:
            lo -= 1
        while self.cum[hi + 1] - self.cum[leaf_id + 1] < alpha and hi < self.n_leaves - 1:
            hi += 1
        return lo, hi
