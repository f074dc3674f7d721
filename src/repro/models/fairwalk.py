"""Fairwalk random walk model (Rahman et al., IJCAI'19; paper Eq. 5).

Node2vec with per-attribute-group fairness: the dynamic weight divides
``α · w_vu`` by the number of the current node's neighbors that share
the candidate's attribute group (Table IV's ``|K|``), so each group is
selected uniformly before node2vec biasing within it. The per-state
constant ``1/|Φ|`` cancels in the M-H ratio and in normalization, so it
is omitted.
"""
from __future__ import annotations

from dataclasses import dataclass

import numpy as np

from repro.core.abstraction import RandomWalkModel, WalkerBatch, node2vec_alpha
from repro.graph.csr import CSRGraph


@dataclass
class FairWalk(RandomWalkModel):
    p: float = 1.0
    q: float = 1.0
    name = "fairwalk"
    order = 2
    needs_types = True

    def dyn_weight(self, g: CSRGraph, wk: WalkerBatch, cand_eidx: np.ndarray):
        cand = g.indices[cand_eidx].astype(np.int64)
        alpha = node2vec_alpha(g, wk.prev, cand, self.p, self.q)
        cnt = g.attr_count()[wk.cur, g.node_attr[cand]]
        return alpha * g.weights[cand_eidx] / np.maximum(cnt, 1)

    def state_index(self, g: CSRGraph, wk: WalkerBatch) -> np.ndarray:
        return wk.prev_eidx

    def num_states(self, g: CSRGraph) -> int:
        return g.m

    def alpha_bound(self) -> float:
        return max(1.0, 1.0 / self.p, 1.0 / self.q)
