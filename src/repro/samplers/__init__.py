"""Edge-sampler registry.

``make_sampler(name, ...)`` builds any of the paper's samplers:
``mh`` (+ ``mh-random`` / ``mh-weight`` / ``mh-burn`` shorthands for the
initialization strategies of §III-C), ``alias``, ``direct``,
``rejection``, ``knightking``, ``memory_aware``.
"""
from __future__ import annotations

from typing import Optional

import numpy as np

from repro.core.abstraction import RandomWalkModel
from repro.graph.csr import CSRGraph
from repro.samplers.alias import TableSampler
from repro.samplers.base import (
    EdgeSampler,
    MemoryBudget,
    MemoryBudgetExceeded,
    StaticSampler,
)
from repro.samplers.direct import DirectSampler
from repro.samplers.knightking import KnightKingSampler
from repro.samplers.memory_aware import MemoryAwareSampler
from repro.samplers.rejection import RejectionSampler

SAMPLER_NAMES = (
    "mh",
    "mh-random",
    "mh-weight",
    "mh-burn",
    "alias",
    "direct",
    "rejection",
    "knightking",
    "memory_aware",
)


def make_sampler(
    name: str,
    g: CSRGraph,
    model: RandomWalkModel,
    rng: np.random.Generator,
    budget: Optional[MemoryBudget] = None,
    **kw,
) -> EdgeSampler:
    # Imported lazily: core.mh_sampler itself depends on samplers.base,
    # so a top-level import here would be circular.
    from repro.core.mh_sampler import MHSampler

    if name in ("mh", "mh-weight"):
        return MHSampler(g, model, rng, budget, init="weight", **kw)
    if name == "mh-random":
        return MHSampler(g, model, rng, budget, init="random", **kw)
    if name == "mh-burn":
        return MHSampler(g, model, rng, budget, init="burn", **kw)
    if name == "alias":
        return TableSampler(g, model, rng, budget)
    if name == "direct":
        return DirectSampler(g, model, rng, budget)
    if name == "rejection":
        return RejectionSampler(g, model, rng, budget)
    if name == "knightking":
        return KnightKingSampler(g, model, rng, budget)
    if name == "memory_aware":
        return MemoryAwareSampler(g, model, rng, budget, **kw)
    raise KeyError(name)


__all__ = [
    "EdgeSampler",
    "MemoryBudget",
    "MemoryBudgetExceeded",
    "StaticSampler",
    "TableSampler",
    "DirectSampler",
    "RejectionSampler",
    "KnightKingSampler",
    "MemoryAwareSampler",
    "make_sampler",
    "SAMPLER_NAMES",
]
