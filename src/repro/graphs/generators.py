"""Synthetic edge-labeled graphs (paper §VI-b) and paper-figure fixtures.

Two generator models, matching the paper:

- **ER** (Erdős–Rényi): ``|E|`` directed edges with uniformly random
  endpoints — near-uniform degree distribution.
- **BA** (Barabási–Albert, as JGraphT builds it): a complete directed core of
  ``core`` vertices, then each new vertex attaches ``|E|/|V|`` edges to
  existing vertices by preferential attachment. Edge orientation is
  randomized so the core is strongly cyclic, like the paper's highly-cyclic
  web graphs. The paper uses a core of ``|V|/2000``; at our ~100x-smaller
  scale the core is set per-graph so the analogs keep a dense cyclic core.

Edge labels follow a Zipfian distribution with exponent 2 over ``n_labels``
labels (paper: "generated according to the Zipfian distribution with
exponent 2"). Self loops (length-1 cycles, Table III "Loop Count") are added
explicitly where the paper's graph has them.

``ANALOGS`` is the Table III substitution registry: a deterministic scaled
analog for each of the 13 real-world graphs (no network access in this
environment), carrying the paper's own row so jobs can print paper-vs-ours.
"""
from __future__ import annotations

from dataclasses import dataclass

import numpy as np
import pandas as pd
from pyspark.sql import SparkSession

from repro.core.graph import LabeledGraph


def zipf_labels(g: np.random.Generator, n: int, n_labels: int, exponent: float = 2.0) -> np.ndarray:
    """``n`` label strings ``l0..l{n_labels-1}`` drawn Zipf(exponent)."""
    ranks = np.arange(1, n_labels + 1, dtype="float64")
    w = ranks**-exponent
    w /= w.sum()
    idx = g.choice(n_labels, size=n, p=w)
    return np.char.add("l", idx.astype("str"))


def _edges_pdf(src: np.ndarray, dst: np.ndarray, labels: np.ndarray) -> pd.DataFrame:
    return pd.DataFrame({"src": src.astype("int64"), "label": labels, "dst": dst.astype("int64")})


def er_graph(
    spark: SparkSession,
    *,
    n_vertices: int,
    n_edges: int,
    n_labels: int,
    n_loops: int = 0,
    seed: int = 0,
) -> LabeledGraph:
    """Erdős–Rényi digraph with Zipf(2) labels and ``n_loops`` self loops."""
    g = np.random.default_rng(seed)
    # Oversample: (src,label,dst) triples are deduplicated by LabeledGraph.
    m = int(n_edges * 1.08) + 8
    src = g.integers(0, n_vertices, m)
    dst = g.integers(0, n_vertices, m)
    keep = src != dst
    src, dst = src[keep][:n_edges], dst[keep][:n_edges]
    pdf = _edges_pdf(src, dst, zipf_labels(g, len(src), n_labels))
    if n_loops:
        lv = g.integers(0, n_vertices, n_loops)
        pdf = pd.concat([pdf, _edges_pdf(lv, lv, zipf_labels(g, n_loops, n_labels))])
    return LabeledGraph.from_pandas(spark, pdf)


def ba_graph(
    spark: SparkSession,
    *,
    n_vertices: int,
    n_edges: int,
    n_labels: int,
    core: int = 20,
    n_loops: int = 0,
    seed: int = 0,
) -> LabeledGraph:
    """Barabási–Albert digraph: complete directed core + preferential attachment.

    ``n_edges`` is a target; the core contributes ``core*(core-1)`` edges and
    each of the remaining vertices attaches ``max(1, remaining/|V|)`` edges.
    Each attachment edge's orientation is a fair coin flip so cycles form
    through the core (the paper's BA graphs are its most cyclic synthetics).
    """
    g = np.random.default_rng(seed)
    core = min(core, n_vertices)
    cs, cd = np.meshgrid(np.arange(core), np.arange(core))
    cs, cd = cs.ravel(), cd.ravel()
    keep = cs != cd
    src_parts = [cs[keep]]
    dst_parts = [cd[keep]]
    n_core_edges = int(keep.sum())
    n_rest = max(n_vertices - core, 1)
    m = max(1, (n_edges - n_core_edges) // n_rest)
    # Preferential attachment via the repeated-endpoint trick: every endpoint
    # occurrence in `targets` is one unit of degree mass.
    targets = list(np.concatenate([cs[keep], cd[keep]]))
    t_arr = np.array(targets)
    for v in range(core, n_vertices):
        picks = t_arr[g.integers(0, len(t_arr), m)]
        vs = np.full(m, v)
        flip = g.random(m) < 0.5
        src_parts.append(np.where(flip, picks, vs))
        dst_parts.append(np.where(flip, vs, picks))
        t_arr = np.concatenate([t_arr, picks, vs])
    src = np.concatenate(src_parts)
    dst = np.concatenate(dst_parts)
    pdf = _edges_pdf(src, dst, zipf_labels(g, len(src), n_labels))
    if n_loops:
        lv = g.integers(0, n_vertices, n_loops)
        pdf = pd.concat([pdf, _edges_pdf(lv, lv, zipf_labels(g, n_loops, n_labels))])
    return LabeledGraph.from_pandas(spark, pdf)


# ---------------------------------------------------------------------------
# Paper figure fixtures
# ---------------------------------------------------------------------------

#: Fig. 2 example graph, reconstructed from Table II + Examples 3-5 (the
#: figure image is not in the provided text). The reconstruction reproduces
#: the paper's IN-OUT order (v1,v3,v2,v4,v5,v6) — including the v4/v5
#: tie-break — and every Table II index entry (asserted in tests).
FIG2_EDGES: list[tuple[int, str, int]] = [
    (1, "l2", 3), (1, "l1", 2),
    (2, "l2", 5), (2, "l1", 5),
    (3, "l2", 4), (3, "l2", 1), (3, "l1", 6), (3, "l1", 2),
    (4, "l1", 1), (4, "l3", 6),
    (5, "l1", 1),
]


def fig2_graph(spark: SparkSession) -> LabeledGraph:
    return LabeledGraph.from_edge_list(spark, FIG2_EDGES)


#: Fig. 1 running example (social/professional/financial network). Vertex ids:
#: P10..P13, P16 are persons 10..13 and 16; A14, E15, A17, E18, A19 are
#: accounts/entities 14, 15, 17, 18, 19. Satisfies every fact the paper states
#: about Fig. 1: Q1(A14, A19, (debits,credits)+) = true, Q2(P10, P13,
#: (knows,knows,worksFor)+) = false, MR of the P10->P16 example path is
#: (knows, worksFor), S^2(P12, P16) = {(knows), (knows, worksFor)}, and both a
#: knows^3 and a knows^4 path exist from P10 to P16.
FIG1_EDGES: list[tuple[int, str, int]] = [
    (10, "knows", 11), (11, "knows", 13), (11, "worksFor", 12),
    (12, "knows", 13), (13, "knows", 12), (13, "worksFor", 16),
    (12, "knows", 16), (13, "knows", 16),
    (14, "debits", 15), (15, "credits", 17), (17, "debits", 18), (18, "credits", 19),
    (10, "holds", 14), (12, "holds", 17),
]


def fig1_graph(spark: SparkSession) -> LabeledGraph:
    return LabeledGraph.from_edge_list(spark, FIG1_EDGES)


# ---------------------------------------------------------------------------
# Real-world-graph analogs (Table III substitution registry)
# ---------------------------------------------------------------------------

@dataclass(frozen=True)
class Analog:
    """A deterministic scaled stand-in for one Table III real-world graph."""

    name: str
    full_name: str
    scale: str  # downscale factor vs the paper's graph, e.g. "1/100"
    model: str  # "er" | "ba"
    n_vertices: int
    n_edges: int
    n_labels: int
    n_loops: int
    core: int  # BA complete-core size (ignored for ER)
    seed: int
    # Paper's Table III row: (|V|, |E|, |L|, loop count, triangle count)
    paper: tuple[int, int, int, int, int]

    def scaled(self, factor: float) -> "Analog":
        """A further-downscaled variant (used by fast benchmark defaults);
        keeps the label set and the loop/edge density proportions."""
        from dataclasses import replace

        return replace(
            self,
            name=f"{self.name}x{factor:g}",
            scale=f"{self.scale}*{factor:g}",
            n_vertices=max(20, int(self.n_vertices * factor)),
            n_edges=max(40, int(self.n_edges * factor)),
            n_loops=int(self.n_loops * factor),
            core=max(6, int(self.core * factor)) if self.model == "ba" else 0,
        )

    def build(self, spark: SparkSession) -> LabeledGraph:
        kw = dict(
            n_vertices=self.n_vertices,
            n_edges=self.n_edges,
            n_labels=self.n_labels,
            n_loops=self.n_loops,
            seed=self.seed,
        )
        if self.model == "ba":
            return ba_graph(spark, core=self.core, **kw)
        return er_graph(spark, **kw)


_B = 1_000_000_000
_M = 1_000_000
_K = 1_000

ANALOGS: dict[str, Analog] = {
    a.name: a
    for a in [
        Analog("AD", "Advogato", "1/10", "er", 600, 5100, 3, 400, 0, 101,
               (6 * _K, 51 * _K, 3, 4 * _K, 98 * _K)),
        Analog("EP", "Soc-Epinions", "1/50", "ba", 1500, 10160, 8, 0, 30, 102,
               (75 * _K, 508 * _K, 8, 0, 1_600 * _K)),
        Analog("TW", "Twitter-ICWSM", "1/100", "er", 4650, 8340, 8, 0, 0, 103,
               (465 * _K, 834 * _K, 8, 0, 38 * _K)),
        Analog("WN", "Web-NotreDame", "1/100", "ba", 3250, 14000, 8, 270, 40, 104,
               (325 * _K, 1_400 * _K, 8, 27 * _K, 8_900 * _K)),
        Analog("WS", "Web-Stanford", "1/100", "ba", 2810, 20000, 8, 0, 40, 105,
               (281 * _K, 2 * _M, 8, 0, 11 * _M)),
        Analog("WG", "Web-Google", "1/200", "ba", 4375, 25000, 8, 0, 45, 106,
               (875 * _K, 5 * _M, 8, 0, 13 * _M)),
        Analog("WT", "Wiki-Talk", "1/400", "ba", 5750, 12500, 8, 0, 40, 107,
               (2_300 * _K, 5 * _M, 8, 0, 9 * _M)),
        Analog("WB", "Web-BerkStan", "1/200", "ba", 3425, 35000, 8, 0, 50, 108,
               (685 * _K, 7 * _M, 8, 0, 64 * _M)),
        Analog("WH", "Wiki-hyperlink", "1/400", "ba", 4250, 71250, 8, 10, 55, 109,
               (1_700 * _K, 28_500 * _K, 8, 4 * _K, 52 * _M)),
        Analog("PR", "Pokec", "1/400", "ba", 4000, 76500, 8, 0, 50, 110,
               (1_600 * _K, 30_600 * _K, 8, 0, 32 * _M)),
        Analog("SO", "StackOverflow", "1/800", "ba", 3250, 79250, 3, 18750, 60, 111,
               (2_600 * _K, 63_400 * _K, 3, 15 * _M, 114 * _M)),
        Analog("LJ", "LiveJournal", "1/800", "ba", 6000, 86000, 50, 0, 60, 112,
               (4_800 * _K, 68_900 * _K, 50, 0, 285 * _M)),
        Analog("WF", "Wiki-link-fr", "1/800", "ba", 4125, 154625, 25, 24, 65, 113,
               (3_300 * _K, 123_700 * _K, 25, 19 * _K, 30 * _B)),
    ]
}


def build_analog(spark: SparkSession, name: str) -> LabeledGraph:
    """Build the analog graph for a Table III dataset abbreviation."""
    return ANALOGS[name].build(spark)
