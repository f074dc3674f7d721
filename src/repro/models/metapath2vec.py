"""Metapath2vec random walk model (Dong et al., KDD'17; paper Eq. 4).

The walk is constrained to follow a metapath of node types; the state
is ``(T, v)`` where ``T`` is the next required type — #states =
|V| · #types. Candidates of the wrong type get dynamic weight 0.
"""
from __future__ import annotations

from dataclasses import dataclass, field
from typing import List

import numpy as np

from repro.core.abstraction import RandomWalkModel, WalkerBatch
from repro.graph.csr import CSRGraph


@dataclass
class MetaPath2Vec(RandomWalkModel):
    #: e.g. [0, 1, 0] ~ "A-P-A"; must start and usually end on the same
    #: type so the pattern tiles along the walk.
    metapath: List[int] = field(default_factory=lambda: [0, 1, 0])
    name = "metapath2vec"
    order = 1
    needs_types = True

    def __post_init__(self):
        # The repeating cycle of types along the walk.
        mp = list(self.metapath)
        self._cycle = mp[:-1] if len(mp) > 1 and mp[0] == mp[-1] else mp

    def dyn_weight(self, g: CSRGraph, wk: WalkerBatch, cand_eidx: np.ndarray):
        cand = g.indices[cand_eidx].astype(np.int64)
        ok = g.node_type[cand] == wk.req_type
        return np.where(ok, g.weights[cand_eidx], 0.0)

    def state_index(self, g: CSRGraph, wk: WalkerBatch) -> np.ndarray:
        return wk.cur * np.int64(g.n_types) + wk.req_type

    def num_states(self, g: CSRGraph) -> int:
        return g.n * g.n_types

    def start_nodes(self, g: CSRGraph) -> np.ndarray:
        return np.where(g.node_type == self._cycle[0])[0].astype(np.int64)

    def required_type(self, g: CSRGraph, step: int, start_type: np.ndarray):
        """Type required of the node reached at ``step`` (start = 0)."""
        c = self._cycle
        return np.full_like(start_type, c[step % len(c)], dtype=np.int16)

    def stuck(self, g: CSRGraph, wk: WalkerBatch) -> np.ndarray:
        """Dead end: no neighbor of the required type (or no neighbor)."""
        base = g.degree(wk.cur) == 0
        tc = g.type_count()
        has = tc[wk.cur, wk.req_type] > 0
        return base | ~has
