"""Unit tests for the driver-side union-find (repro.primitives.unionfind)."""
import numpy as np
import pytest
from hypothesis import given, settings
from hypothesis import strategies as st

from repro.primitives.unionfind import UnionFind


def test_initial_singletons():
    uf = UnionFind(5)
    assert uf.n_components == 5
    assert uf.labels() == [0, 1, 2, 3, 4]


def test_union_reduces_components():
    uf = UnionFind(4)
    assert uf.union(0, 1)
    assert uf.n_components == 3
    assert uf.connected(0, 1)
    assert not uf.connected(0, 2)


def test_union_idempotent():
    uf = UnionFind(3)
    assert uf.union(0, 1)
    assert not uf.union(1, 0)
    assert uf.n_components == 2


def test_chain_connectivity():
    uf = UnionFind(10)
    for i in range(9):
        uf.union(i, i + 1)
    assert uf.n_components == 1
    r = uf.find(0)
    assert all(uf.find(i) == r for i in range(10))


def test_two_components():
    uf = UnionFind(6)
    uf.union(0, 1)
    uf.union(1, 2)
    uf.union(3, 4)
    assert uf.n_components == 3
    assert uf.connected(0, 2)
    assert uf.connected(3, 4)
    assert not uf.connected(2, 3)
    assert not uf.connected(0, 5)


def test_union_by_size_keeps_find_shallow():
    uf = UnionFind(1000)
    for i in range(1, 1000):
        uf.union(0, i)
    assert uf.n_components == 1


@settings(max_examples=50, deadline=None)
@given(
    n=st.integers(2, 40),
    edges=st.lists(st.tuples(st.integers(0, 39), st.integers(0, 39)), max_size=80),
)
def test_matches_reference_components(n, edges):
    """Union-find components equal a BFS reference on random graphs."""
    edges = [(a % n, b % n) for a, b in edges]
    uf = UnionFind(n)
    for a, b in edges:
        uf.union(a, b)
    # BFS reference
    adj = [[] for _ in range(n)]
    for a, b in edges:
        adj[a].append(b)
        adj[b].append(a)
    label = [-1] * n
    for s in range(n):
        if label[s] >= 0:
            continue
        stack, label[s] = [s], s
        while stack:
            u = stack.pop()
            for v in adj[u]:
                if label[v] < 0:
                    label[v] = s
                    stack.append(v)
    got = uf.labels()
    # Same partition (compare via canonical grouping)
    group_got = {}
    group_ref = {}
    for i in range(n):
        group_got.setdefault(got[i], set()).add(i)
        group_ref.setdefault(label[i], set()).add(i)
    assert set(map(frozenset, group_got.values())) == set(map(frozenset, group_ref.values()))


def test_labels_deterministic():
    uf1, uf2 = UnionFind(8), UnionFind(8)
    for uf in (uf1, uf2):
        uf.union(2, 5)
        uf.union(5, 7)
    assert uf1.labels() == uf2.labels()
