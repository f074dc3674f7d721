"""Benchmark harness utilities: timing, paper-scaled budgets, tables.

Shared by the ``jobs/`` table harnesses and the ``benchmarks/`` suite.
"""
from __future__ import annotations

import os
import time
from typing import List, Sequence

from repro.datasets import DatasetSpec
from repro.graph.csr import CSRGraph
from repro.samplers.base import MemoryBudget

#: Paper-normalized CSR cost: 4 bytes (neighbor id) per directed slot.
BYTES_GRAPH_PER_SLOT = 4


class Timer:
    """``with Timer() as t: ...; t.s`` — wall seconds."""

    def __enter__(self):
        self.t0 = time.perf_counter()
        return self

    def __exit__(self, *exc):
        self.s = time.perf_counter() - self.t0
        return False

    def __float__(self):
        return float(getattr(self, "s", 0.0))


def paper_budget(spec: DatasetSpec, g: CSRGraph) -> MemoryBudget:
    """A :class:`MemoryBudget` scaled like the paper's 96 GB server
    against the dataset's true size, pre-charged with the CSR itself —
    samplers whose tables would not have fit on the paper's machine
    raise :class:`MemoryBudgetExceeded` here, reproducing the ``*``
    cells of Tables VI/VII."""
    b = MemoryBudget(spec.budget_bytes(g), label=spec.name)
    b.charge("graph_csr", BYTES_GRAPH_PER_SLOT * g.m)
    return b


def fmt_cell(v, width: int = 9) -> str:
    if v is None:
        return "-".rjust(width)
    if isinstance(v, str):
        return v.rjust(width)
    return f"{v:.2f}".rjust(width)


def print_table(
    title: str,
    header: Sequence[str],
    rows: List[Sequence],
    out=None,
) -> str:
    """Render an aligned text table; prints and returns it."""
    widths = [
        max(len(str(h)), *(len(fmt_cell(r[i]).strip()) for r in rows)) + 2
        if rows
        else len(str(h)) + 2
        for i, h in enumerate(header)
    ]
    lines = [title]
    lines.append("".join(str(h).rjust(w) for h, w in zip(header, widths)))
    for r in rows:
        lines.append("".join(fmt_cell(c, w) for c, w in zip(r, widths)))
    text = "\n".join(lines)
    print(text, file=out)
    return text


def get_or_create_spark(app: str = "repro-job"):
    """SparkSession for standalone ``jobs/`` entry points (tests use the
    conftest ``spark`` fixture instead). Mirrors the conftest config:
    local[*], broadcast joins disabled, Arrow on."""
    os.environ.setdefault(
        "PYSPARK_SUBMIT_ARGS",
        f"--master {os.environ.get('SPARK_MASTER', 'local[*]')} "
        f"--driver-memory {os.environ.get('SPARK_DRIVER_MEM', '40g')} "
        "--conf spark.driver.host=127.0.0.1 "
        "--conf spark.ui.enabled=false pyspark-shell",
    )
    from pyspark.sql import SparkSession

    return (
        SparkSession.builder.appName(app)
        .config("spark.sql.shuffle.partitions", "64")
        .config("spark.sql.execution.arrow.pyspark.enabled", "true")
        .config("spark.sql.autoBroadcastJoinThreshold", -1)
        .getOrCreate()
    )
