"""Disjoint-set (union–find) substrate, used by the D4-lite baseline for
local-domain components and strong-domain merging."""
from __future__ import annotations

from typing import Hashable, Iterable


class UnionFind:
    """Union–find with path compression and union by size over arbitrary
    hashable keys; unseen keys become singletons on first touch."""

    def __init__(self) -> None:
        self._parent: dict[Hashable, Hashable] = {}
        self._size: dict[Hashable, int] = {}

    def find(self, x: Hashable) -> Hashable:
        parent = self._parent
        if x not in parent:
            parent[x] = x
            self._size[x] = 1
            return x
        root = x
        while parent[root] != root:
            root = parent[root]
        while parent[x] != root:  # path compression
            parent[x], x = root, parent[x]
        return root

    def union(self, a: Hashable, b: Hashable) -> Hashable:
        ra, rb = self.find(a), self.find(b)
        if ra == rb:
            return ra
        if self._size[ra] < self._size[rb]:
            ra, rb = rb, ra
        self._parent[rb] = ra
        self._size[ra] += self._size[rb]
        return ra

    def groups(self, keys: Iterable[Hashable] | None = None) -> dict[Hashable, list]:
        """root → members, over ``keys`` (default: every key ever seen)."""
        out: dict[Hashable, list] = {}
        for k in list(keys if keys is not None else self._parent):
            out.setdefault(self.find(k), []).append(k)
        return out
