"""Tests for the distributed NFA-guided batch BFS baseline."""
import pytest

from repro.core.graph import LabeledGraph
from repro.core.labels import all_mrs
from repro.core.querygen import queries_to_df
from repro.core.sequential import brute_force_closure
from repro.baselines.online import batch_nfa_bfs
from repro.graphs.generators import fig2_graph
from tests.util import adjacency_edges, query_universe, seeded_graph


def test_batch_bfs_fig2_full_universe(spark):
    g = fig2_graph(spark)
    out_adj = {v: [] for v in range(1, 7)}
    from repro.graphs.generators import FIG2_EDGES

    for s, l, t in FIG2_EDGES:
        out_adj[s].append((l, t))
    truth = brute_force_closure(out_adj, 2)
    queries = [(s, t, L) for s in range(1, 7) for t in range(1, 7)
               for L in all_mrs(["l1", "l2", "l3"], 2)]
    ans = {
        r.qid: r.answer
        for r in batch_nfa_bfs(g, queries_to_df(spark, queries)).collect()
    }
    for qid, (s, t, L) in enumerate(queries):
        assert ans[qid] == ((s, t, L) in truth), (s, t, L)


@pytest.mark.parametrize("seed", [2])
def test_batch_bfs_random_graph(spark, seed):
    out_adj, _, labels, k = seeded_graph(seed)
    g = LabeledGraph.from_edge_list(spark, adjacency_edges(out_adj))
    truth = brute_force_closure(out_adj, k)
    queries = query_universe(len(out_adj), all_mrs(labels, k))[:400]
    ans = {
        r.qid: r.answer
        for r in batch_nfa_bfs(g, queries_to_df(spark, queries)).collect()
    }
    for qid, (s, t, L) in enumerate(queries):
        assert ans[qid] == ((s, t, L) in truth), (s, t, L)
