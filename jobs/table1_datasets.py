"""Table 1 reproduction: the evaluation graphs.

Prints each paper graph next to its synthetic analog (nodes/edges/max
degree/signature), documenting the dataset substitution at a glance.

    spark-submit jobs/table1_datasets.py
"""
import pandas as pd

from _common import emit
from repro.graphs import datasets


def run(spark=None, quick: bool = True) -> pd.DataFrame:
    rows = []
    for spec in datasets.DATASETS.values():
        g = spec.graph()
        rows.append(
            {
                "graph": spec.name,
                "paper_Mnodes": spec.paper_mnodes,
                "paper_Medges": spec.paper_medges,
                "paper_source": spec.paper_source,
                "paper_k": spec.paper_max_k,
                "ours_nodes": g.n,
                "ours_edges": g.m,
                "ours_max_deg": g.max_degree,
                "signature": spec.signature,
            }
        )
    return pd.DataFrame(rows)


if __name__ == "__main__":
    emit("table1_datasets", run())
