"""Query-workload generation (paper §VI-c).

The paper generates, per graph, 1000 true-queries and 1000 false-queries of
shape ``(a . b)+`` with ``a != b``: uniformly pick source, target and
constraint, decide the ground truth with a bidirectional BFS, and place the
query in the matching set until both sets are full.

:func:`generate_query_sets` reproduces that procedure (with a configurable
constraint length so the Table V workloads Q1 ``a+`` and Q3 ``(a.b.c)+`` use
the same machinery) and an attempt cap so sparse graphs where true-queries
are rare terminate with smaller sets rather than spinning forever.
"""
from __future__ import annotations

import random
from typing import Sequence

import pandas as pd
from pyspark.sql import DataFrame, SparkSession

from repro.baselines.online import bibfs
from repro.core.labels import Seq, encode, is_primitive
from repro.core.sequential import Adjacency

Query = tuple[int, int, Seq]  # (src, dst, constraint)


def generate_query_sets(
    out_adj: Adjacency,
    in_adj: Adjacency,
    labels: Sequence[str],
    *,
    n_true: int,
    n_false: int,
    mr_len: int = 2,
    seed: int = 0,
    max_attempts: int | None = None,
) -> tuple[list[Query], list[Query]]:
    """Return ``(true_queries, false_queries)`` with ground truth from BiBFS."""
    rng = random.Random(seed)
    vertices = sorted(out_adj.keys() | in_adj.keys())
    labels = sorted(set(labels))
    if mr_len > 1 and len(labels) < 2:
        raise ValueError("need >= 2 labels for concatenation constraints")
    trues: list[Query] = []
    falses: list[Query] = []
    attempts = 0
    cap = max_attempts or 400 * (n_true + n_false)
    while (len(trues) < n_true or len(falses) < n_false) and attempts < cap:
        attempts += 1
        s = rng.choice(vertices)
        t = rng.choice(vertices)
        # distinct labels, as in the paper's (a o b)+ sets; when the alphabet
        # is smaller than mr_len, sample with repetition but keep only
        # minimum repeats (Definition 1 requires L = MR(L)).
        while True:
            if mr_len <= len(labels):
                L = tuple(rng.sample(labels, mr_len))
            else:
                L = tuple(rng.choices(labels, k=mr_len))
            if is_primitive(L):
                break
        if bibfs(out_adj, in_adj, s, t, L):
            if len(trues) < n_true:
                trues.append((s, t, L))
        elif len(falses) < n_false:
            falses.append((s, t, L))
    return trues, falses


def queries_to_df(spark: SparkSession, queries: list[Query]) -> DataFrame:
    """``(qid, src, dst, mr)`` DataFrame for batch evaluation."""
    pdf = pd.DataFrame(
        [(i, s, t, encode(L)) for i, (s, t, L) in enumerate(queries)],
        columns=["qid", "src", "dst", "mr"],
    )
    return spark.createDataFrame(pdf)
