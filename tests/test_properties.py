"""Hypothesis property tests for the pure-Python algorithmic cores."""
import numpy as np
from hypothesis import given, settings
from hypothesis import strategies as st

from repro.core.compress import all_shortest_path_edges, bfs_parents
from repro.core.metrics import node_score
from repro.core.walks import walk_from

# random small graphs as edge lists over a fixed node universe
NODES = list("abcdefgh")
edges_st = st.sets(
    st.tuples(st.sampled_from(NODES), st.sampled_from(NODES)).filter(
        lambda e: e[0] < e[1]
    ),
    max_size=14,
)


def _adj(edges):
    adj = {n: [] for n in NODES}
    for u, v in sorted(edges):
        adj[u].append(v)
        adj[v].append(u)
    return adj


class TestBfsProperties:
    @given(edges_st)
    @settings(max_examples=60, deadline=None)
    def test_distance_triangle(self, edges):
        adj = _adj(edges)
        dist, _ = bfs_parents(adj, "a")
        for u, nbrs in adj.items():
            if u not in dist:
                continue
            for v in nbrs:
                assert dist[v] <= dist[u] + 1

    @given(edges_st)
    @settings(max_examples=60, deadline=None)
    def test_parent_edges_consistent(self, edges):
        adj = _adj(edges)
        dist, parents = bfs_parents(adj, "a")
        for v, ps in parents.items():
            for p in ps:
                assert dist[p] == dist[v] - 1
                assert v in adj[p]

    @given(edges_st, st.sampled_from(NODES), st.sampled_from(NODES))
    @settings(max_examples=60, deadline=None)
    def test_shortest_path_edges_real(self, edges, src, dst):
        adj = _adj(edges)
        out = all_shortest_path_edges(adj, src, dst)
        edge_set = {(min(u, v), max(u, v)) for u in adj for v in adj[u]}
        for e in out:
            assert e in edge_set

    @given(edges_st, st.sampled_from(NODES), st.sampled_from(NODES))
    @settings(max_examples=60, deadline=None)
    def test_symmetric_in_endpoints(self, edges, src, dst):
        adj = _adj(edges)
        assert sorted(all_shortest_path_edges(adj, src, dst)) == sorted(
            all_shortest_path_edges(adj, dst, src)
        )


class TestWalkProperties:
    @given(edges_st, st.sampled_from(NODES), st.integers(min_value=1, max_value=12),
           st.integers(min_value=0, max_value=5))
    @settings(max_examples=60, deadline=None)
    def test_walk_valid(self, edges, start, length, seed):
        adj = _adj(edges)
        w = walk_from(adj, start, length, np.random.default_rng(seed))
        assert w[0] == start
        assert 1 <= len(w) <= length
        for u, v in zip(w, w[1:]):
            assert v in adj[u]


paths_st = st.lists(st.sampled_from(list("xyzuvw")), min_size=1, max_size=6).map(tuple)


class TestNodeScoreProperties:
    @given(paths_st, paths_st)
    @settings(max_examples=100, deadline=None)
    def test_bounded(self, p1, p2):
        s = node_score(p1, p2)
        assert 0.0 <= s <= 1.0

    @given(paths_st, paths_st)
    @settings(max_examples=100, deadline=None)
    def test_symmetric(self, p1, p2):
        assert node_score(p1, p2) == node_score(p2, p1)

    @given(paths_st)
    @settings(max_examples=100, deadline=None)
    def test_identity(self, p):
        assert node_score(p, p) == 1.0
