"""Greedy Qd-tree layout construction (Yang et al., SIGMOD'20; paper ref [7]).

A Qd-tree is a binary decision tree whose inner nodes hold predicates drawn
from the query workload; routing a record down the tree to a leaf yields its
partition id. The paper builds Qd-trees with "the greedy construction
algorithm ... based on a 0.1% to 1% sample of the dataset" (§VI-A1); we do
the same:

- candidate cuts are harvested from workload predicates (range bounds
  become numeric threshold cuts ``col < v``; IN-predicates become set-
  membership cuts),
- starting from a single root, repeatedly split the (leaf, cut) pair with
  the largest *skipping benefit* — the expected number of sampled rows that
  become skippable for the sampled workload — until the target partition
  count ``k`` is reached or no split helps,
- benefit uses node-level metadata refined only on the cut column, the
  standard approximation that keeps construction metadata-only.

The returned :class:`QdTreeLayout` assigns BIDs to any dataframe by vectorized
tree routing, so the same object drives both the simulator (metadata from the
full frame) and the Spark reorganization job (mapInPandas).
"""
from __future__ import annotations

import heapq
import itertools
from dataclasses import dataclass, field

import numpy as np
import pandas as pd

from repro.workload.queries import InPredicate, Query, RangePredicate


@dataclass(frozen=True)
class NumCut:
    """Numeric threshold cut: left subtree holds rows with ``col < v``."""

    col: str
    v: float


@dataclass(frozen=True)
class CatCut:
    """Categorical membership cut: left subtree holds rows with ``col ∈ values``."""

    col: str
    values: frozenset[str]


Cut = NumCut | CatCut


@dataclass
class _Node:
    """Tree node; leaves carry ``bid``, inner nodes carry ``cut`` + children."""

    cut: Cut | None = None
    left: "_Node | None" = None
    right: "_Node | None" = None
    bid: int = -1


@dataclass(frozen=True)
class QdTreeLayout:
    """An immutable, routable Qd-tree with ``n_partitions`` leaves."""

    root: _Node = field(compare=False)
    n_partitions: int
    name: str = "qdtree"

    def assign(self, pdf: pd.DataFrame) -> np.ndarray:
        """BID per row of ``pdf`` by vectorized routing through the tree."""
        bids = np.empty(len(pdf), dtype=np.int64)
        idx = np.arange(len(pdf))
        stack = [(self.root, idx)]
        while stack:
            node, rows = stack.pop()
            if node.cut is None:
                bids[rows] = node.bid
                continue
            if isinstance(node.cut, NumCut):
                m = pdf[node.cut.col].to_numpy()[rows] < node.cut.v
            else:
                m = pdf[node.cut.col].iloc[rows].isin(node.cut.values).to_numpy()
            stack.append((node.left, rows[m]))
            stack.append((node.right, rows[~m]))
        return bids


def harvest_cuts(queries: list[Query] | tuple[Query, ...], max_cuts: int = 128, seed: int = 0) -> list[Cut]:
    """Extract deduplicated candidate cuts from workload predicates.

    Range bound ``lo`` becomes ``col < lo`` (rows below can be skipped for
    the query); bound ``hi`` becomes ``col < nextafter(hi)`` so rows at or
    below ``hi`` land left. If more than ``max_cuts`` distinct cuts exist,
    a uniform subsample is kept (deterministic in ``seed``).
    """
    cuts: dict[Cut, None] = {}
    for q in queries:
        for p in q.predicates:
            if isinstance(p, RangePredicate):
                if p.lo is not None:
                    cuts.setdefault(NumCut(p.col, float(p.lo)), None)
                if p.hi is not None:
                    cuts.setdefault(NumCut(p.col, float(np.nextafter(p.hi, np.inf))), None)
            elif isinstance(p, InPredicate):
                cuts.setdefault(CatCut(p.col, p.values), None)
    out = list(cuts)
    if len(out) > max_cuts:
        g = np.random.default_rng(seed)
        keep = g.choice(len(out), size=max_cuts, replace=False)
        out = [out[i] for i in sorted(keep)]
    return out


def _overlaps_num(pred: RangePredicate, lo: float, hi: float) -> bool:
    if pred.lo is not None and hi < pred.lo:
        return False
    if pred.hi is not None and lo > pred.hi:
        return False
    return True


class _Leaf:
    """Mutable build-time leaf: sample rows + metadata + accessed queries."""

    __slots__ = ("rows", "ranges", "distinct", "accessed")

    def __init__(self, rows: np.ndarray, ranges: dict, distinct: dict, accessed: list[int]):
        self.rows = rows  # indices into the sample frame
        self.ranges = ranges  # col -> (lo, hi) over sample rows
        self.distinct = distinct  # col -> frozenset over sample rows
        self.accessed = accessed  # indices of queries this leaf cannot skip


def build_qdtree(
    sample: pd.DataFrame,
    queries: list[Query] | tuple[Query, ...],
    k: int,
    *,
    categorical_cols: tuple[str, ...] = (),
    max_cuts: int = 128,
    max_queries: int = 64,
    min_leaf_frac: float = 0.25,
    name: str = "qdtree",
    seed: int = 0,
) -> QdTreeLayout:
    """Greedily build a Qd-tree with up to ``k`` leaves from a data sample.

    ``min_leaf_frac`` bounds leaf size at ``min_leaf_frac * len(sample)/k``
    so partitions stay near the target size (the paper sizes partitions at
    1–2M rows). Deterministic in ``seed``.
    """
    if k < 1:
        raise ValueError("k must be >= 1")
    queries = list(queries)
    if len(queries) > max_queries:
        step = len(queries) / max_queries
        queries = [queries[int(i * step)] for i in range(max_queries)]

    cuts = harvest_cuts(queries, max_cuts=max_cuts, seed=seed)
    # Group query predicates by column for incremental benefit evaluation.
    preds_by_qcol: list[dict[str, list]] = []
    for q in queries:
        d: dict[str, list] = {}
        for p in q.predicates:
            d.setdefault(p.col, []).append(p)
        preds_by_qcol.append(d)

    cols = [c for c in sample.columns if c != "BID"]
    num_cols = [c for c in cols if c not in categorical_cols]
    colarr = {c: sample[c].to_numpy() for c in cols}

    def leaf_accessed(ranges: dict, distinct: dict, cand: list[int]) -> list[int]:
        out = []
        for qi in cand:
            ok = True
            for col, preds in preds_by_qcol[qi].items():
                for p in preds:
                    if isinstance(p, RangePredicate):
                        lo, hi = ranges[col]
                        if not _overlaps_num(p, lo, hi):
                            ok = False
                            break
                    else:
                        if p.values.isdisjoint(distinct[col]):
                            ok = False
                            break
                if not ok:
                    break
            if ok:
                out.append(qi)
        return out

    all_rows = np.arange(len(sample))
    root_ranges = {
        c: (float(colarr[c].min()), float(colarr[c].max())) if len(sample) else (0.0, 0.0)
        for c in num_cols
    }
    root_distinct = {c: frozenset(colarr[c]) for c in categorical_cols}
    root_leaf = _Leaf(
        all_rows, root_ranges, root_distinct, leaf_accessed(root_ranges, root_distinct, list(range(len(queries))))
    )

    min_rows = max(1, int(min_leaf_frac * len(sample) / k))

    def best_split(leaf: _Leaf):
        """Return (benefit, cut, left_mask) of the best cut for this leaf."""
        best = (0.0, None, None)
        n_leaf = len(leaf.rows)
        for cut in cuts:
            c = cut.col
            # Queries whose accessibility a cut on column c can change.
            qs = [qi for qi in leaf.accessed if c in preds_by_qcol[qi]]
            if not qs:
                continue
            if isinstance(cut, NumCut):
                lo, hi = leaf.ranges.get(c, (None, None))
                if lo is None or not (lo < cut.v <= hi):
                    continue
                vals = colarr[c][leaf.rows]
                lm = vals < cut.v
                n1 = int(lm.sum())
                if n1 < min_rows or n_leaf - n1 < min_rows:
                    continue
                # Child metadata refined on the cut column only.
                lmeta = (lo, float(np.nextafter(cut.v, -np.inf)))
                rmeta = (cut.v, hi)
                ben = 0.0
                for qi in qs:
                    a1 = a2 = True
                    for p in preds_by_qcol[qi][c]:
                        if isinstance(p, RangePredicate):
                            a1 = a1 and _overlaps_num(p, *lmeta)
                            a2 = a2 and _overlaps_num(p, *rmeta)
                    ben += n_leaf - n1 * a1 - (n_leaf - n1) * a2
            else:
                dset = leaf.distinct.get(c)
                if dset is None:
                    continue
                inter = dset & cut.values
                if not inter or inter == dset:
                    continue
                lm = pd.Index(colarr[c][leaf.rows]).isin(cut.values)
                n1 = int(lm.sum())
                if n1 < min_rows or n_leaf - n1 < min_rows:
                    continue
                ldist, rdist = inter, dset - cut.values
                ben = 0.0
                for qi in qs:
                    a1 = a2 = True
                    for p in preds_by_qcol[qi][c]:
                        if isinstance(p, InPredicate):
                            a1 = a1 and not p.values.isdisjoint(ldist)
                            a2 = a2 and not p.values.isdisjoint(rdist)
                    ben += n_leaf - n1 * a1 - (n_leaf - n1) * a2
            if ben > best[0]:
                best = (float(ben), cut, np.asarray(lm))
        return best

    def split_leaf(leaf: _Leaf, cut: Cut, lm: np.ndarray) -> tuple[_Leaf, _Leaf]:
        rows_l, rows_r = leaf.rows[lm], leaf.rows[~lm]
        if isinstance(cut, NumCut):
            rl = dict(leaf.ranges)
            rr = dict(leaf.ranges)
            vl = colarr[cut.col][rows_l]
            vr = colarr[cut.col][rows_r]
            rl[cut.col] = (float(vl.min()), float(vl.max()))
            rr[cut.col] = (float(vr.min()), float(vr.max()))
            dl = dr = leaf.distinct
        else:
            rl = rr = leaf.ranges
            dl = dict(leaf.distinct)
            dr = dict(leaf.distinct)
            dl[cut.col] = frozenset(colarr[cut.col][rows_l])
            dr[cut.col] = frozenset(colarr[cut.col][rows_r])
        return (
            _Leaf(rows_l, rl, dl, leaf_accessed(rl, dl, leaf.accessed)),
            _Leaf(rows_r, rr, dr, leaf_accessed(rr, dr, leaf.accessed)),
        )

    # Greedy loop with a lazy max-heap of candidate splits.
    counter = itertools.count()
    root_node = _Node()
    heap: list = []
    leaf_info: dict[int, tuple[_Leaf, _Node]] = {}

    def push(leaf: _Leaf, node: _Node) -> None:
        hid = next(counter)
        leaf_info[hid] = (leaf, node)
        ben, cut, lm = best_split(leaf)
        if cut is not None:
            heapq.heappush(heap, (-ben, hid, cut, lm))

    push(root_leaf, root_node)
    n_leaves = 1
    while n_leaves < k and heap:
        negben, hid, cut, lm = heapq.heappop(heap)
        if hid not in leaf_info:
            continue
        leaf, node = leaf_info.pop(hid)
        lleaf, rleaf = split_leaf(leaf, cut, lm)
        node.cut = cut
        node.left, node.right = _Node(), _Node()
        push(lleaf, node.left)
        push(rleaf, node.right)
        n_leaves += 1

    # Number leaves in deterministic (DFS) order.
    bid = 0
    stack = [root_node]
    while stack:
        nd = stack.pop()
        if nd.cut is None:
            nd.bid = bid
            bid += 1
        else:
            stack.append(nd.right)
            stack.append(nd.left)
    return QdTreeLayout(root=root_node, n_partitions=bid, name=name)
