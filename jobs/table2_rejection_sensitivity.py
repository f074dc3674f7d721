"""Table II — rejection-sampler parameter sensitivity (node2vec).

Runs node2vec random walk generation with the rejection edge sampler on
the Flickr stand-in across the paper's five (p, q) settings, reporting
walk time, average acceptance ratio, and the time ratio relative to
(1, 1). The paper's numbers (Flickr, C++): times 6.74/13.88/6.08/6.21/
15.81 s, AC ratios 0.86/0.36/1.00/0.99/0.25.

Uses the partition-local kernel directly (single process) because the
acceptance-ratio statistics live in the sampler object.

Run: ``python jobs/table2_rejection_sensitivity.py``.
"""
from __future__ import annotations

import numpy as np

from repro.bench_utils import Timer, print_table
from repro.datasets import load
from repro.models import make_model
from repro.samplers import make_sampler
from repro.walks.kernel import simulate_walks

PQ_GRID = [(1, 0.25), (1, 4), (1, 1), (4, 1), (0.25, 1)]
PAPER = {
    (1, 0.25): (6.74, 0.86),
    (1, 4): (13.88, 0.36),
    (1, 1): (6.08, 1.00),
    (4, 1): (6.21, 0.99),
    (0.25, 1): (15.81, 0.25),
}


def run(dataset: str = "flickr_lite", num_walks: int = 10, walk_length: int = 80):
    g = load(dataset)
    results = {}
    for p, q in PQ_GRID:
        model = make_model("node2vec", p=p, q=q)
        s = make_sampler("rejection", g, model, np.random.default_rng(0))
        s.prepare()
        starts = np.tile(model.start_nodes(g), num_walks)
        with Timer() as t:
            simulate_walks(g, model, starts, walk_length, s, s.rng)
        results[(p, q)] = (t.s, s.acceptance_ratio)
    return results


def main():
    res = run()
    base = res[(1, 1)][0]
    rows = []
    for pq in PQ_GRID:
        t, ac = res[pq]
        pt, pac = PAPER[pq]
        rows.append(
            [
                f"({pq[0]},{pq[1]})",
                f"{t:.2f}",
                f"{ac:.2f}",
                f"{t / base:.2f}X",
                f"{pt:.2f}",
                f"{pac:.2f}",
                f"{pt / PAPER[(1, 1)][0]:.2f}X",
            ]
        )
    print_table(
        "Table II — node2vec + rejection sampler on flickr_lite (ours vs paper)",
        ["(p,q)", "Time(s)", "AC", "TimeRatio", "paper_T", "paper_AC", "paper_TR"],
        rows,
    )
    return rows


if __name__ == "__main__":
    main()
