"""Connected-components substrate for cluster queries.

The paper's theory uses Gazit's O(log n)-span connectivity; its
implementation uses concurrent union-find (§6.2). We provide both
flavors: a distributed min-label-propagation algorithm over DataFrames
(scalable path) and a driver-side union-find (fast path for the small
core subgraphs queries produce — mirroring the paper's own choice).
"""
from repro.cc.label_prop import connected_components_df
from repro.cc.union_find import UnionFind, components_from_edges

__all__ = ["connected_components_df", "UnionFind", "components_from_edges"]
