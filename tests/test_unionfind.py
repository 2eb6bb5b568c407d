"""Tests for the union–find substrate (repro.graph.unionfind)."""
from hypothesis import given, settings
from hypothesis import strategies as st

from repro.graph.unionfind import UnionFind


def test_singletons():
    uf = UnionFind()
    assert uf.find("a") == "a"
    assert uf.find("b") == "b"
    assert uf.find("a") != uf.find("b")


def test_union_links():
    uf = UnionFind()
    uf.union("a", "b")
    assert uf.find("a") == uf.find("b")


def test_transitivity():
    uf = UnionFind()
    uf.union(1, 2)
    uf.union(2, 3)
    uf.union(4, 5)
    assert uf.find(1) == uf.find(3)
    assert uf.find(1) != uf.find(4)


def test_groups_partition():
    uf = UnionFind()
    uf.union("a", "b")
    uf.find("c")
    groups = uf.groups()
    members = sorted(m for g in groups.values() for m in g)
    assert members == ["a", "b", "c"]
    assert sorted(len(g) for g in groups.values()) == [1, 2]


def test_groups_subset_keys():
    uf = UnionFind()
    uf.union(1, 2)
    uf.union(3, 4)
    groups = uf.groups([1, 3])
    assert sorted(len(g) for g in groups.values()) == [1, 1]


@settings(max_examples=50, deadline=None)
@given(st.lists(st.tuples(st.integers(0, 15), st.integers(0, 15)), max_size=40))
def test_matches_naive_connectivity(edges):
    uf = UnionFind()
    for a, b in edges:
        uf.union(a, b)
    # naive reachability over the same edge set
    adj = {}
    for a, b in edges:
        adj.setdefault(a, set()).add(b)
        adj.setdefault(b, set()).add(a)

    def reach(x):
        seen, stack = {x}, [x]
        while stack:
            u = stack.pop()
            for v in adj.get(u, ()):  # noqa: B905
                if v not in seen:
                    seen.add(v)
                    stack.append(v)
        return seen

    nodes = {n for e in edges for n in e}
    for a in nodes:
        for b in nodes:
            assert (uf.find(a) == uf.find(b)) == (b in reach(a))
