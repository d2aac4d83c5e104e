"""Tests for the faithful sequential Algorithm 1+2 implementation.

The strongest check here is the exact reproduction of the paper's Table II
(the full RLC index contents for the Fig. 2 graph with k=2), followed by
fuzzing against the brute-force concise closure: sound + complete (Theorem 3)
and condensed (Theorem 2) on seeded random graphs.
"""
import pytest

from repro.core.labels import all_mrs
from repro.core.sequential import (
    SequentialRlcIndex,
    brute_force_closure,
    inout_order,
)
from repro.graphs.generators import FIG2_EDGES
from tests.util import condensed_violations, query_universe, seeded_graph


def fig2_adjacency():
    out_adj: dict[int, list] = {v: [] for v in range(1, 7)}
    in_adj: dict[int, list] = {v: [] for v in range(1, 7)}
    for s, l, t in FIG2_EDGES:
        out_adj[s].append((l, t))
        in_adj[t].append((l, s))
    return out_adj, in_adj


@pytest.fixture(scope="module")
def fig2_index():
    out_adj, in_adj = fig2_adjacency()
    return SequentialRlcIndex(out_adj, in_adj, k=2)


# ---- the paper's running example -----------------------------------------

def test_inout_order_matches_paper():
    out_adj, in_adj = fig2_adjacency()
    aid = inout_order(out_adj, in_adj)
    assert sorted(aid, key=aid.get) == [1, 3, 2, 4, 5, 6]
    assert aid[3] == 2  # "aid(v3) = 2" in §V-B


#: Table II verbatim (hub vertex, minimum repeat) per vertex.
TABLE_II_OUT = {
    1: {(1, ("l2",)), (1, ("l1",)), (1, ("l2", "l1"))},
    2: {(1, ("l2", "l1")), (1, ("l1",))},
    3: {(1, ("l2",)), (1, ("l2", "l1")), (1, ("l1",)), (3, ("l1", "l2"))},
    4: {(1, ("l1",)), (3, ("l1", "l2"))},
    5: {(1, ("l1",)), (3, ("l1", "l2"))},
    6: set(),
}
TABLE_II_IN = {
    1: set(),
    2: {(1, ("l1",)), (1, ("l2", "l1"))},
    3: {(1, ("l2",)), (1, ("l1", "l2"))},
    4: {(1, ("l2",))},
    5: {(1, ("l1", "l2")), (1, ("l1",)), (3, ("l1", "l2")), (2, ("l2",))},
    6: {(1, ("l2", "l1")), (3, ("l1",)), (3, ("l2", "l3")), (4, ("l3",))},
}


def test_table2_exact_reproduction(fig2_index):
    lo, li = fig2_index.entries()
    for v in range(1, 7):
        assert lo.get(v, set()) == TABLE_II_OUT[v], f"L_out(v{v})"
        assert li.get(v, set()) == TABLE_II_IN[v], f"L_in(v{v})"


def test_table2_entry_count(fig2_index):
    assert fig2_index.entry_count() == 26


@pytest.mark.parametrize(
    "s,t,L,expected",
    [
        (3, 6, ("l2", "l1"), True),  # Example 3, Q1
        (1, 2, ("l2", "l1"), True),  # Example 3, Q2
        (1, 3, ("l1",), False),      # Example 3, Q3
        (1, 3, ("l2",), True),
        (1, 1, ("l1",), True),       # l1-cycle v1->v2->v5->v1
        (1, 1, ("l2",), True),
        (6, 1, ("l1",), False),      # v6 has no out-edges
        (4, 6, ("l3",), True),
        (3, 4, ("l2",), True),       # covered via Case 1 (hub v1)
    ],
)
def test_paper_example_queries(fig2_index, s, t, L, expected):
    assert fig2_index.query(s, t, L) is expected


def test_query_rejects_invalid_constraint(fig2_index):
    with pytest.raises(ValueError):
        fig2_index.query(1, 2, ("l1", "l1"))  # not a minimum repeat
    with pytest.raises(ValueError):
        fig2_index.query(1, 2, ("l1", "l2", "l3"))  # |L| > k
    with pytest.raises(ValueError):
        fig2_index.query(1, 2, ())


def test_fig2_full_equivalence_with_closure(fig2_index):
    out_adj, _ = fig2_adjacency()
    closure = brute_force_closure(out_adj, 2)
    for s, t, L in query_universe(7, all_mrs(["l1", "l2", "l3"], 2)):
        if s == 0 or t == 0:
            continue
        assert fig2_index.query(s, t, L) == ((s, t, L) in closure)


def test_fig2_condensed(fig2_index):
    assert condensed_violations(fig2_index) == []


# ---- fuzzing vs brute force (Theorems 2 and 3) ----------------------------

@pytest.mark.parametrize("seed", range(25))
def test_sound_complete_on_random_graphs(seed):
    out_adj, in_adj, labels, k = seeded_graph(seed)
    idx = SequentialRlcIndex(out_adj, in_adj, k)
    closure = brute_force_closure(out_adj, k)
    n = len(out_adj)
    for s, t, L in query_universe(n, all_mrs(labels, k)):
        assert idx.query(s, t, L) == ((s, t, L) in closure), (s, t, L)


@pytest.mark.parametrize("seed", range(25))
def test_condensed_on_random_graphs(seed):
    out_adj, in_adj, _, k = seeded_graph(seed)
    idx = SequentialRlcIndex(out_adj, in_adj, k)
    assert condensed_violations(idx) == []


@pytest.mark.parametrize("seed", range(8))
def test_entries_are_sound(seed):
    # Every entry states a real constrained reachability (soundness of the
    # entry tables themselves, not just of query answers).
    out_adj, in_adj, _, k = seeded_graph(seed)
    idx = SequentialRlcIndex(out_adj, in_adj, k)
    closure = brute_force_closure(out_adj, k)
    lo, li = idx.entries()
    for v, es in lo.items():
        for hub, L in es:
            assert (v, hub, L) in closure
    for v, es in li.items():
        for hub, L in es:
            assert (hub, v, L) in closure


def test_from_entries_roundtrip(fig2_index):
    lo, li = fig2_index.entries()
    out_entries = [(v, h, m) for v, es in lo.items() for h, m in es]
    in_entries = [(v, h, m) for v, es in li.items() for h, m in es]
    clone = SequentialRlcIndex.from_entries(fig2_index.aid, 2, out_entries, in_entries)
    for s, t, L in query_universe(7, all_mrs(["l1", "l2", "l3"], 2)):
        if s and t:
            assert clone.query(s, t, L) == fig2_index.query(s, t, L)


def test_index_smaller_than_closure_on_fig2(fig2_index):
    out_adj, _ = fig2_adjacency()
    assert fig2_index.entry_count() < len(brute_force_closure(out_adj, 2))


@pytest.mark.parametrize("seed", [2, 7, 13])
def test_index_grows_with_k(seed):
    # Appendix C shape: index size rises (weakly) as k grows, since every
    # k-MR of length <= k is also a (k+1)-MR candidate set member.
    out_adj, in_adj, _, _ = seeded_graph(seed)
    sizes = [
        SequentialRlcIndex(out_adj, in_adj, k).entry_count() for k in (1, 2, 3)
    ]
    assert sizes[0] <= sizes[1] <= sizes[2]


@pytest.mark.parametrize("k", [1, 2, 3])
def test_kleene_star_reduction(fig2_index, k):
    # §III-B: (s, t, L*) reduces to s == t or (s, t, L+). Spot-check the
    # reduction on fig2: star is plus for distinct endpoints, true for s == t.
    def star(s, t, L):
        return s == t or fig2_index.query(s, t, L)

    assert star(1, 1, ("l3",)) is True      # empty path satisfies L*
    assert star(1, 3, ("l2",)) is True
    assert star(6, 2, ("l1",)) is False
