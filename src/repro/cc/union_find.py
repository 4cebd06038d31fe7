"""Driver-side union-find with path compression and union by size.

The paper's query implementation replaces a full parallel connectivity
algorithm with concurrent union-find over the (small) core subgraph
(§6.2); this is the sequential equivalent used when the core subgraph
fits comfortably on the driver.
"""
from __future__ import annotations

from collections.abc import Iterable, Hashable


class UnionFind:
    """Classic disjoint-set forest; elements may be any hashable."""

    def __init__(self) -> None:
        self._parent: dict[Hashable, Hashable] = {}
        self._size: dict[Hashable, int] = {}

    def add(self, x: Hashable) -> None:
        if x not in self._parent:
            self._parent[x] = x
            self._size[x] = 1

    def find(self, x: Hashable) -> Hashable:
        self.add(x)
        root = x
        while self._parent[root] != root:
            root = self._parent[root]
        while self._parent[x] != root:  # path compression
            self._parent[x], x = root, self._parent[x]
        return root

    def union(self, a: Hashable, b: Hashable) -> None:
        ra, rb = self.find(a), self.find(b)
        if ra == rb:
            return
        if self._size[ra] < self._size[rb]:
            ra, rb = rb, ra
        self._parent[rb] = ra
        self._size[ra] += self._size[rb]

    def members(self) -> list[Hashable]:
        return list(self._parent)


def components_from_edges(
    edges: Iterable[tuple], vertices: Iterable = ()
) -> dict:
    """Map each vertex to its component's **minimum vertex id**.

    The min-id labeling is the canonical cluster naming used across the
    repo so different engines (Spark, union-find, DuckDB recursive CTE,
    pure-Python BFS) produce directly comparable labels.
    """
    uf = UnionFind()
    for v in vertices:
        uf.add(v)
    for u, v in edges:
        uf.union(u, v)
    # min id per root
    best: dict = {}
    for x in uf.members():
        r = uf.find(x)
        if r not in best or x < best[r]:
            best[r] = x
    return {x: best[uf.find(x)] for x in uf.members()}
