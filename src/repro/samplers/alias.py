"""Alias-class edge sampler: fully materialized per-state tables.

The paper's alias sampler (Walker '77) precomputes one table per
transition probability distribution: O(1) per sample but
O(d · #states) memory — the memory-explosion baseline. We reproduce its
*cost profile* exactly: ``prepare()`` materializes, for every state,
the full dynamic-weight distribution over the current node's neighbors
(Σ_states deg bytes, charged at alias per-entry cost against the
simulated budget), and sampling is a constant-depth lookup.

Implementation note (DESIGN.md §3): the per-state structure is a
precomputed cumulative table queried by one vectorized binary search
(O(log d)) rather than a literal Vose alias pair — construction
vectorizes across all states, memory is byte-equivalent, and query cost
is indistinguishable at benchmark scale; the defining characteristics
(huge ``T_i``, O(d·#state) memory, parameter-insensitive sampling) are
preserved.
"""
from __future__ import annotations

import numpy as np

from repro.core.abstraction import WalkerBatch
from repro.graph.csr import CSRGraph
from repro.models.metapath2vec import MetaPath2Vec
from repro.samplers.base import (
    BYTES_TABLE_ENTRY,
    EdgeSampler,
    MemoryBudgetExceeded,
    REAL_ENTRY_CAP,
)
from repro.samplers.segment import ragged_arange, segment_ids


def _enumerate_states(g: CSRGraph, model):
    """Per-state metadata for full table materialization.

    Returns ``(state_ids, cur, prev, prev_eidx, req_type, ent_lens)``
    where entry ``i`` describes state ``state_ids[i]`` whose
    distribution ranges over the ``ent_lens[i]`` neighbors of
    ``cur[i]``.
    """
    if model.order == 2:
        # One state per directed edge (s -> v); distribution over N(v).
        states = np.arange(g.m, dtype=np.int64)
        cur = g.indices.astype(np.int64)
        prev = g.src
        prev_eidx = states
        req = None
        lens = g.degree(cur)
    elif isinstance(model, MetaPath2Vec):
        # One state per (node, required type).
        T = g.n_types
        states = np.arange(g.n * T, dtype=np.int64)
        cur = states // T
        req = (states % T).astype(np.int16)
        prev = np.full_like(cur, -1)
        prev_eidx = np.full_like(cur, -1)
        lens = g.degree(cur)
    else:
        # One state per node (deepwalk).
        states = np.arange(g.n, dtype=np.int64)
        cur = states
        prev = np.full_like(cur, -1)
        prev_eidx = np.full_like(cur, -1)
        req = None
        lens = g.degree(cur)
    return states, cur, prev, prev_eidx, req, lens


class TableSampler(EdgeSampler):
    """"Alias" in the reproduced tables."""

    name = "alias"

    def prepare(self) -> None:
        g, model = self.g, self.model
        states, cur, prev, prev_eidx, req, lens = _enumerate_states(g, model)
        total = int(lens.sum())
        # Simulated-budget charge first (this is what reproduces the
        # paper's OOM cells), then the real-allocation guardrail.
        self.budget.charge("alias_tables", BYTES_TABLE_ENTRY * total)
        if total > REAL_ENTRY_CAP:
            raise MemoryBudgetExceeded(
                f"alias tables need {total:.2e} real entries > cap {REAL_ENTRY_CAP:.0e}"
            )

        sid = segment_ids(lens)
        within = ragged_arange(lens)
        cand_eidx = g.indptr[cur][sid] + within
        wk_flat = WalkerBatch(
            cur=cur[sid],
            prev=prev[sid],
            prev_eidx=prev_eidx[sid],
            req_type=None if req is None else req[sid],
        )
        w = model.dyn_weight(g, wk_flat, cand_eidx)
        # Global running cumsum over all per-state segments; per-state
        # windows are recovered from offsets, so one searchsorted serves
        # every query.
        self._cum = np.concatenate([[0.0], np.cumsum(w, dtype=np.float64)])
        offs = np.zeros(states.shape[0] + 1, dtype=np.int64)
        np.cumsum(lens, out=offs[1:])
        self._offs = offs
        self._prepared = True

    def sample(self, wk: WalkerBatch) -> np.ndarray:
        if not self._prepared:
            self.prepare()
        g = self.g
        state = self.model.state_index(g, wk)
        lo = self._offs[state]
        hi = self._offs[state + 1]
        base = self._cum[lo]
        totals = self._cum[hi] - base
        target = base + self.rng.random(len(wk)) * totals
        pos = np.searchsorted(self._cum, target, side="right") - 1
        pos = np.clip(pos, lo, np.maximum(hi - 1, lo))
        within = pos - lo
        eidx = g.indptr[wk.cur] + within
        self.stats["proposals"] += len(wk)
        self.stats["accepts"] += len(wk)
        return np.where(totals > 1e-300, eidx, -1)
