"""Shared dataset construction/caching for experiments and benchmarks."""
from __future__ import annotations

from functools import lru_cache

from repro.graphs.storage import SparkGraph
from repro.graphs.weights import as_ref_graph, build_dataset_pandas
from repro.ref.graph import RefGraph

#: graphs small enough for the quadratic OnlineAll baseline
SMALL = ["email", "youtube"]
#: mid-size set used for parameter sweeps
MID = ["email", "youtube", "wiki", "livejournal", "orkut"]
#: all eight Table-1 analogs
ALL = ["email", "youtube", "wiki", "livejournal", "orkut", "arabic", "uk", "twitter"]


@lru_cache(maxsize=None)
def ref_graph(name: str, scale: float = 1.0) -> RefGraph:
    """Cached sequential-substrate analog (deterministic in name+scale)."""
    vertices, edges = build_dataset_pandas(name, scale=scale)
    return as_ref_graph(edges, vertices)


def spark_graph(spark, name: str, scale: float = 1.0) -> SparkGraph:
    vertices, edges = build_dataset_pandas(name, scale=scale)
    return SparkGraph.from_pandas(spark, vertices, edges)
