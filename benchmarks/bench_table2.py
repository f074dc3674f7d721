"""Benchmark for Table II — rejection-sampler (p,q) sensitivity.

One benchmark per (p, q) cell: node2vec walk generation with the
rejection edge sampler on flickr_lite (the paper's Flickr). The
relative timings across cells reproduce the paper's Time-Ratio row;
``jobs/table2_rejection_sensitivity.py`` prints the full table.
"""
import numpy as np
import pytest

from repro.datasets import load
from repro.models import make_model
from repro.samplers import make_sampler
from repro.walks.kernel import simulate_walks

PQ = [(1, 0.25), (1, 4), (1, 1), (4, 1), (0.25, 1)]


@pytest.mark.parametrize("p,q", PQ, ids=[f"p{p}q{q}" for p, q in PQ])
def test_table2_rejection_walk(benchmark, p, q):
    g = load("flickr_lite")
    model = make_model("node2vec", p=p, q=q)
    starts = np.tile(model.start_nodes(g), 2)

    def run():
        s = make_sampler("rejection", g, model, np.random.default_rng(0))
        s.prepare()
        simulate_walks(g, model, starts, 80, s, s.rng)
        return s.acceptance_ratio

    ac = benchmark.pedantic(run, rounds=2, iterations=1, warmup_rounds=0)
    benchmark.extra_info["acceptance_ratio"] = round(ac, 3)
