"""Helpers to move graphs between the ref substrate, pandas, and Spark."""
import pandas as pd

from repro.graphs.storage import SparkGraph
from repro.ref.graph import RefGraph


def ref_to_pandas(g: RefGraph):
    vertices = pd.DataFrame(
        {"id": list(g.weight), "weight": [g.weight[v] for v in g.weight]}
    ).astype({"id": "int64", "weight": "float64"})
    el = g.edge_list()
    edges = pd.DataFrame(el, columns=["src", "dst"]).astype("int64") if el else (
        pd.DataFrame({"src": pd.Series(dtype="int64"), "dst": pd.Series(dtype="int64")})
    )
    return vertices, edges


def ref_to_spark(spark, g: RefGraph) -> SparkGraph:
    vertices, edges = ref_to_pandas(g)
    return SparkGraph.from_pandas(spark, vertices, edges)


def random_ref_graph(n: int, m: int, seed: int = 0) -> RefGraph:
    import numpy as np

    rng = np.random.default_rng(seed)
    pairs = {(int(a), int(b)) for a, b in zip(rng.integers(0, n, 3 * m), rng.integers(0, n, 3 * m)) if a < b}
    edges = sorted(pairs)[:m]
    perm = rng.permutation(n)
    return RefGraph({v: float(perm[v] + 1) for v in range(n)}, edges)
