"""Shared test helpers: random labeled graphs and index property checks."""
from __future__ import annotations

import random

from repro.core.labels import Seq
from repro.core.sequential import Adjacency, SequentialRlcIndex


def rand_adjacency(
    rng: random.Random, n: int, m: int, labels: list[str], loops: int = 0
) -> tuple[Adjacency, Adjacency]:
    """Random labeled digraph as (out_adj, in_adj); edges deduplicated."""
    out_adj: Adjacency = {v: [] for v in range(n)}
    in_adj: Adjacency = {v: [] for v in range(n)}
    seen: set[tuple[int, str, int]] = set()

    def add(s: int, lbl: str, t: int) -> None:
        if (s, lbl, t) not in seen:
            seen.add((s, lbl, t))
            out_adj[s].append((lbl, t))
            in_adj[t].append((lbl, s))

    for _ in range(m):
        add(rng.randrange(n), rng.choice(labels), rng.randrange(n))
    for _ in range(loops):
        v = rng.randrange(n)
        add(v, rng.choice(labels), v)
    return out_adj, in_adj


def adjacency_edges(out_adj: Adjacency) -> list[tuple[int, str, int]]:
    return [(s, lbl, t) for s, nb in out_adj.items() for lbl, t in nb]


def seeded_graph(seed: int) -> tuple[Adjacency, Adjacency, list[str], int]:
    """Deterministic random test graph family indexed by seed:
    returns (out_adj, in_adj, labels, k)."""
    rng = random.Random(seed)
    n = rng.randrange(5, 30)
    m = rng.randrange(n, 4 * n)
    labels = ["a", "b", "c"][: rng.randrange(1, 4)]
    k = rng.choice([1, 2, 3])
    loops = rng.randrange(0, 4)
    out_adj, in_adj = rand_adjacency(rng, n, m, labels, loops)
    return out_adj, in_adj, labels, k


def condensed_violations(idx: SequentialRlcIndex) -> list[tuple]:
    """Non-degenerate Definition 5 violations: an entry with a Case-1 cover
    that does not use the entry itself (see tests/test_sequential.py)."""
    lo, li = idx.entries()
    bad = []
    for s, es in lo.items():
        for t, L in es:
            for u, L2 in es:
                if L2 == L and u != t and (u, L) in li.get(t, set()):
                    bad.append(("out", s, t, L, u))
    for t, es in li.items():
        for s, L in es:
            for u, L2 in lo.get(s, set()):
                if L2 == L and u != s and (u, L) in es:
                    bad.append(("in", s, t, L, u))
    return bad


def query_universe(
    n: int, mrs: list[Seq]
) -> list[tuple[int, int, Seq]]:
    return [(s, t, L) for s in range(n) for t in range(n) for L in mrs]
