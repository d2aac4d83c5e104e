"""Table III reproduction: overview statistics of the (analog) graphs.

For each of the paper's 13 real-world graphs we build the deterministic
scaled analog (DESIGN.md §4) and measure |V|, |E|, |L|, loop count and
triangle count with the Spark jobs in :mod:`repro.graphs.stats`.
"""
from __future__ import annotations

import time

from pyspark.sql import SparkSession

from repro.graphs.generators import ANALOGS
from repro.graphs.stats import table3_row

DEFAULT_NAMES = list(ANALOGS)


def run(spark: SparkSession, names: list[str] | None = None, scale: float = 1.0) -> list[dict]:
    rows = []
    for name in names or DEFAULT_NAMES:
        spec = ANALOGS[name]
        if scale != 1.0:
            spec = spec.scaled(scale)
        g = spec.build(spark)
        t0 = time.monotonic()
        row = table3_row(g)
        row.update(
            name=name,
            scale=spec.scale,
            seconds=round(time.monotonic() - t0, 2),
            paper=ANALOGS[name].paper,
        )
        rows.append(row)
        g.unpersist()
    return rows


def format_table(rows: list[dict]) -> str:
    hdr = (
        f"{'graph':<6} {'scale':<10} | {'V':>8} {'E':>9} {'L':>3} {'loops':>7} {'tri':>10}"
        f" | paper: {'V':>9} {'E':>11} {'L':>3} {'loops':>9} {'tri':>13}"
    )
    lines = ["Table III — graph overview (measured analog vs paper graph)", hdr]
    for r in rows:
        pv, pe, pl, plo, ptr = r["paper"]
        lines.append(
            f"{r['name']:<6} {r['scale']:<10} | {r['V']:>8} {r['E']:>9} {r['L']:>3}"
            f" {r['loops']:>7} {r['triangles']:>10}"
            f" | {pv:>16} {pe:>11} {pl:>3} {plo:>9} {ptr:>13}"
        )
    return "\n".join(lines)
