"""Figures 15 + 16 (as tables) — effectiveness and efficiency on the
four small graphs with two distinct ground-truth communities
(Karate exact; Dolphin/Mexican/Polblogs analogs per DESIGN.md §5).

Full §6.1 roster including GN and clique (they fit at this scale;
GN gets a Polblogs-sized budget cut exactly as in the paper).
"""
import pandas as pd

from repro.evaluation.datasets import small_real
from repro.evaluation.harness import run_algorithms, standard_algorithms, summarize
from repro.evaluation.queries import query_sets

from _common import emit, get_spark


def run(spark=None, n_queries: int = 10) -> pd.DataFrame:
    frames = []
    for name, (g, comms) in small_real().items():
        queries = query_sets(g, comms, n_sets=n_queries, q_size=1, seed=6)
        algos = standard_algorithms(
            g,
            nca_budget=120.0,
            gn_max_nodes=400,       # GN times out on Polblogs (paper §6.3)
            clique_max_nodes=3000,
        )
        df = run_algorithms(g, comms, algos, queries, dataset=name)
        frames.append(summarize(df))
        print(f"[e15] finished {name}")
    return emit("e15_small_real", pd.concat(frames, ignore_index=True))


if __name__ == "__main__":
    run()
