"""Immutable CSR graph structure (paper §IV-C "Network Storage").

The paper stores the network as compressed sparse row (CSR): a node
offset array plus an edge (neighbor) array, with optional per-edge
weights and per-node types. We freeze the cleaned edge list produced by
Spark (see :mod:`repro.graph.builder`) into numpy arrays so it can be
broadcast to executors and sampled with vectorized numerics.

A sorted composite key ``src * n + dst`` over all directed edge slots
gives vectorized ``O(log m)`` ``has_edge`` / ``edge_index`` lookups —
this is the binary search the paper charges to node2vec's dynamic
weight calculation (§III-A complexity analysis).
"""
from __future__ import annotations

from dataclasses import dataclass, field
from typing import Optional

import numpy as np


@dataclass(frozen=True)
class CSRGraph:
    """A frozen, symmetrized, weighted (optionally typed) graph.

    Attributes
    ----------
    n : number of nodes (ids are ``0..n-1``).
    indptr : ``int64[n+1]`` — CSR offsets into ``indices``.
    indices : ``int32[m]`` — neighbor ids, **sorted** within each node's
        slice (required by the composite-key binary search).
    weights : ``float64[m]`` — static edge weight per directed slot.
    node_type : ``int16[n]`` — heterogeneous node type (all zeros for
        homogeneous networks).
    node_attr : ``int16[n]`` — fairwalk's protected attribute; equals
        ``node_type`` on heterogeneous networks unless set separately.
    """

    n: int
    indptr: np.ndarray
    indices: np.ndarray
    weights: np.ndarray
    node_type: np.ndarray
    node_attr: np.ndarray
    # Derived arrays, filled in __post_init__.
    src: np.ndarray = field(default=None, repr=False)
    comp_key: np.ndarray = field(default=None, repr=False)

    def __post_init__(self):
        deg = np.diff(self.indptr)
        src = np.repeat(np.arange(self.n, dtype=np.int64), deg)
        object.__setattr__(self, "src", src)
        object.__setattr__(
            self, "comp_key", src * np.int64(self.n) + self.indices.astype(np.int64)
        )

    # ------------------------------------------------------------------
    @property
    def m(self) -> int:
        """Number of directed edge slots."""
        return int(self.indices.shape[0])

    @property
    def n_types(self) -> int:
        """Number of distinct node types (1 for homogeneous networks)."""
        return int(self.node_type.max()) + 1 if self.n else 0

    @property
    def n_attrs(self) -> int:
        """Number of distinct fairwalk attribute groups."""
        return int(self.node_attr.max()) + 1 if self.n else 0

    def degree(self, v: np.ndarray) -> np.ndarray:
        """Vectorized out-degree of nodes ``v``."""
        return (self.indptr[np.asarray(v) + 1] - self.indptr[np.asarray(v)]).astype(
            np.int64
        )

    @property
    def degrees(self) -> np.ndarray:
        return np.diff(self.indptr)

    # ------------------------------------------------------------------
    def edge_index(self, u: np.ndarray, v: np.ndarray) -> np.ndarray:
        """Vectorized directed-edge slot of ``(u, v)``; ``-1`` if absent.

        ``O(log m)`` per query via binary search on the sorted composite
        key — the paper's binary-search cost model for dynamic weights.
        """
        u = np.asarray(u, dtype=np.int64)
        v = np.asarray(v, dtype=np.int64)
        key = u * np.int64(self.n) + v
        pos = np.searchsorted(self.comp_key, key)
        pos_c = np.minimum(pos, self.m - 1)
        hit = (self.comp_key[pos_c] == key) & (pos < self.m)
        return np.where(hit, pos_c, -1).astype(np.int64)

    def has_edge(self, u: np.ndarray, v: np.ndarray) -> np.ndarray:
        """Vectorized edge-existence test (node2vec's ``d(u, s) == 1``)."""
        return self.edge_index(u, v) >= 0

    def neighbors(self, v: int) -> np.ndarray:
        return self.indices[self.indptr[v] : self.indptr[v + 1]]

    def neighbor_weights(self, v: int) -> np.ndarray:
        return self.weights[self.indptr[v] : self.indptr[v + 1]]

    # ------------------------------------------------------------------
    # Lazy caches used by specific models. Computed once, then reused;
    # stored via object.__setattr__ because the dataclass is frozen.
    def type_count(self) -> np.ndarray:
        """``int32[n, n_types]`` — per node, #neighbors of each type.

        Used by metapath2vec (dead-end detection: no neighbor of the
        required type terminates the walk) and fairwalk.
        """
        cached = self.__dict__.get("_type_count")
        if cached is not None:
            return cached
        tc = np.zeros((self.n, self.n_types), dtype=np.int32)
        np.add.at(tc, (self.src, self.node_type[self.indices]), 1)
        object.__setattr__(self, "_type_count", tc)
        return tc

    def attr_count(self) -> np.ndarray:
        """``int32[n, n_attrs]`` — per node, #neighbors in each attribute
        group (fairwalk's ``|K|`` denominator, Table IV)."""
        cached = self.__dict__.get("_attr_count")
        if cached is not None:
            return cached
        ac = np.zeros((self.n, self.n_attrs), dtype=np.int32)
        np.add.at(ac, (self.src, self.node_attr[self.indices]), 1)
        object.__setattr__(self, "_attr_count", ac)
        return ac

    def weight_sums(self) -> np.ndarray:
        """``float64[n]`` — per-node total static weight (rejection /
        KnightKing proposal normalizers)."""
        cached = self.__dict__.get("_weight_sums")
        if cached is not None:
            return cached
        ws = np.zeros(self.n, dtype=np.float64)
        np.add.at(ws, self.src, self.weights)
        object.__setattr__(self, "_weight_sums", ws)
        return ws

    def edge_type(self) -> np.ndarray:
        """``int16[m]`` — edge type per slot, derived from unordered
        endpoint node types (edge2vec's ``Φ(u, v)``)."""
        cached = self.__dict__.get("_edge_type")
        if cached is not None:
            return cached
        tu = self.node_type[self.src].astype(np.int64)
        tv = self.node_type[self.indices].astype(np.int64)
        lo, hi = np.minimum(tu, tv), np.maximum(tu, tv)
        # Dense ids for unordered type pairs {lo, hi}.
        pair = lo * self.n_types + hi
        et = np.unique(pair, return_inverse=True)[1].astype(np.int16)
        object.__setattr__(self, "_edge_type", et)
        return et

    @property
    def n_edge_types(self) -> int:
        return int(self.edge_type().max()) + 1 if self.m else 0

    # ------------------------------------------------------------------
    def nbytes(self) -> int:
        """Approximate resident bytes of the CSR arrays (for the
        proportional memory-budget accounting, DESIGN §3)."""
        return int(
            self.indptr.nbytes
            + self.indices.nbytes
            + self.weights.nbytes
            + self.node_type.nbytes
            + self.node_attr.nbytes
        )


def from_edges(
    src: np.ndarray,
    dst: np.ndarray,
    weight: Optional[np.ndarray] = None,
    n: Optional[int] = None,
    node_type: Optional[np.ndarray] = None,
    node_attr: Optional[np.ndarray] = None,
    symmetrize: bool = True,
) -> CSRGraph:
    """Build a :class:`CSRGraph` from a directed edge array.

    Self-loops are dropped and duplicate edges collapse to their
    minimum weight; when ``symmetrize`` both directions are
    materialized, as the paper's undirected networks require.
    """
    src = np.asarray(src, dtype=np.int64)
    dst = np.asarray(dst, dtype=np.int64)
    if weight is None:
        weight = np.ones(src.shape[0], dtype=np.float64)
    weight = np.asarray(weight, dtype=np.float64)
    if n is None:
        n = int(max(src.max(initial=-1), dst.max(initial=-1))) + 1

    keep = src != dst
    src, dst, weight = src[keep], dst[keep], weight[keep]
    if symmetrize:
        src, dst = np.concatenate([src, dst]), np.concatenate([dst, src])
        weight = np.concatenate([weight, weight])

    key = src * np.int64(n) + dst
    order = np.argsort(key, kind="stable")
    key, src, dst, weight = key[order], src[order], dst[order], weight[order]
    uniq = np.ones(key.shape[0], dtype=bool)
    uniq[1:] = key[1:] != key[:-1]
    starts = np.where(uniq)[0]
    # Duplicate directed pairs collapse to the minimum weight — the same
    # deterministic rule as builder.clean_edges.
    weight = np.minimum.reduceat(weight, starts) if starts.size else weight
    src, dst = src[uniq], dst[uniq]

    deg = np.bincount(src, minlength=n)
    indptr = np.zeros(n + 1, dtype=np.int64)
    np.cumsum(deg, out=indptr[1:])

    if node_type is None:
        node_type = np.zeros(n, dtype=np.int16)
    node_type = np.asarray(node_type, dtype=np.int16)
    if node_attr is None:
        node_attr = node_type.copy()
    node_attr = np.asarray(node_attr, dtype=np.int16)

    return CSRGraph(
        n=n,
        indptr=indptr,
        indices=dst.astype(np.int32),
        weights=weight,
        node_type=node_type,
        node_attr=node_attr,
    )
