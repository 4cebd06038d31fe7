"""Clustering quality measures used in the paper's §7.2: (weighted)
Newman modularity and the adjusted Rand index."""
from repro.quality.ari import adjusted_rand_index, adjusted_rand_index_pandas
from repro.quality.modularity import modularity, modularity_pandas

__all__ = [
    "modularity",
    "modularity_pandas",
    "adjusted_rand_index",
    "adjusted_rand_index_pandas",
]
