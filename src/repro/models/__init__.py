"""Model registry — Tables I & IV of the paper as code.

``MODEL_INFO`` records each model's characteristics from Table I
(#states formula, network type); :func:`make_model` builds a model
instance by name with the paper-suggested hyper-parameters as defaults.
"""
from __future__ import annotations

from typing import Dict

from repro.models.deepwalk import DeepWalk
from repro.models.edge2vec import Edge2Vec
from repro.models.fairwalk import FairWalk
from repro.models.metapath2vec import MetaPath2Vec
from repro.models.node2vec import Node2Vec

#: Table I — characteristics of the five random walk based NRL models.
MODEL_INFO: Dict[str, dict] = {
    "deepwalk": {"states": "|V|", "network": "homogeneous", "order": 1},
    "node2vec": {"states": "|E|", "network": "homogeneous", "order": 2},
    "metapath2vec": {"states": "|V||Phi|", "network": "heterogeneous", "order": 1},
    "edge2vec": {"states": "|E|", "network": "heterogeneous", "order": 2},
    "fairwalk": {"states": "|E|", "network": "attributed", "order": 2},
}


def make_model(name: str, **kw):
    """Instantiate a model by name. ``p``/``q``/``metapath`` accepted
    where applicable; unknown names raise ``KeyError``."""
    if name == "deepwalk":
        return DeepWalk()
    if name == "node2vec":
        return Node2Vec(p=kw.get("p", 1.0), q=kw.get("q", 1.0))
    if name == "metapath2vec":
        return MetaPath2Vec(metapath=kw.get("metapath", [0, 1, 0]))
    if name == "edge2vec":
        # Paper §V-D: edge2vec evaluated at (p, q) = (0.25, 0.25).
        return Edge2Vec(p=kw.get("p", 0.25), q=kw.get("q", 0.25), M=kw.get("M"))
    if name == "fairwalk":
        # Paper §V-D: fairwalk evaluated at (p, q) = (1, 1).
        return FairWalk(p=kw.get("p", 1.0), q=kw.get("q", 1.0))
    raise KeyError(name)


__all__ = [
    "DeepWalk",
    "Node2Vec",
    "MetaPath2Vec",
    "Edge2Vec",
    "FairWalk",
    "MODEL_INFO",
    "make_model",
]
