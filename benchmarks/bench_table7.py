"""Benchmark for Table VII — samplers on a billion-edge stand-in.

Representative cells: node2vec walk generation on twitter_sim at
(p, q) = (1, 1) and (0.25, 1) for every sampler that fits the
paper-scaled memory budget (alias raises — asserted, not timed).
``jobs/table7_billion_edge.py`` prints the full 7×5×2 table.
"""
import numpy as np
import pytest

from repro.bench_utils import paper_budget
from repro.datasets import DATASETS, load
from repro.models import make_model
from repro.samplers import MemoryBudgetExceeded, make_sampler
from repro.walks.engine import count_walk_tokens, generate_walks

DS = "twitter_sim"
FITTING = ["rejection", "knightking", "memory_aware", "mh-random",
           "mh-burn", "mh-weight"]
PQ = [(1, 1), (0.25, 1)]


@pytest.mark.parametrize("p,q", PQ, ids=[f"p{p}q{q}" for p, q in PQ])
@pytest.mark.parametrize("sname", FITTING)
def test_table7_walk_generation(benchmark, spark, sname, p, q):
    g = load(DS)
    model = make_model("node2vec", p=p, q=q)

    def run():
        budget = paper_budget(DATASETS[DS], g)
        s = make_sampler(sname, g, model, np.random.default_rng(0), budget)
        s.prepare()
        walks = generate_walks(spark, g, model, num_walks=1, walk_length=80,
                               prepared=s, seed=0)
        count_walk_tokens(walks)

    benchmark.pedantic(run, rounds=1, iterations=1, warmup_rounds=0)


def test_table7_alias_exceeds_budget(benchmark):
    """Alias on the billion-edge stand-in reproduces the paper's `*`:
    benchmark measures how quickly the ledger rejects it."""
    g = load(DS)
    model = make_model("node2vec")

    def run():
        budget = paper_budget(DATASETS[DS], g)
        s = make_sampler("alias", g, model, np.random.default_rng(0), budget)
        with pytest.raises(MemoryBudgetExceeded):
            s.prepare()

    benchmark.pedantic(run, rounds=3, iterations=1, warmup_rounds=0)
