"""Table 1 — dataset statistics (|V|, |E|, |C|, overlap).

The distributed path is exercised deliberately: each graph is lifted to
the Spark ``Graph`` and |V|/|E| are recomputed with DataFrame
aggregations, cross-checked against the driver-side generator counts.

Run: ``spark-submit jobs/t01_dataset_stats.py`` (or plain python).
"""
import pandas as pd

from repro.evaluation.datasets import REGISTRY, overlapping
from repro.graphs.graph import Graph

from _common import emit, get_spark


def run(spark) -> pd.DataFrame:
    rows = []
    datasets = [(name, build(), False) for name, build in REGISTRY.items()]
    datasets += [(name, gc, True) for name, gc in overlapping().items()]
    for name, (g, comms), overlap in datasets:
        G = Graph.from_local(spark, g)
        v_spark, e_spark = G.num_nodes, G.num_edges
        assert e_spark == g.m, f"{name}: Spark |E| {e_spark} != local {g.m}"
        rows.append(
            dict(dataset=name, V=g.n, E=e_spark, C=len(comms), overlap=overlap,
                 V_spark=v_spark)
        )
    return emit("t01_dataset_stats", pd.DataFrame(rows))


if __name__ == "__main__":
    run(get_spark())
