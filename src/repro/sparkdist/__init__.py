"""Distributed (Catalyst / applyInPandas) implementations."""
from .decomposition import coreness, peel, temporal_kcore_df
from .graph_io import (
    EDGE_SCHEMA,
    degrees,
    detemporalized,
    graph_stats,
    link_strength,
    projected,
)
from .phc import build_phc_index_df, collect_index
from .tcq import distributed_tcq, distributed_tcq_pdf

__all__ = [
    "EDGE_SCHEMA",
    "projected",
    "detemporalized",
    "degrees",
    "link_strength",
    "graph_stats",
    "peel",
    "temporal_kcore_df",
    "coreness",
    "distributed_tcq",
    "distributed_tcq_pdf",
    "build_phc_index_df",
    "collect_index",
]
