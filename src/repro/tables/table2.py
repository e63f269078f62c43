"""Table 2: dataset inventory — paper graphs vs our ``_lite`` substitutes.

Records the realised |V| and |E| of every synthetic stand-in next to the
original's published size, plus the edge factor both share.
"""
from pyspark.sql import SparkSession

from repro.graphgen.datasets import DATASETS
from repro.graphgen.util import graph_counts


def table2_rows(spark: SparkSession) -> list[dict]:
    rows = []
    for name, spec in DATASETS.items():
        n, m = graph_counts(spec.generate(spark))
        rows.append(
            {
                "dataset": name,
                "paper_name": spec.paper_name,
                "kind": spec.kind,
                "V": n,
                "E": m,
                "E/V": round(m / n, 2),
                "paper_V": spec.paper_vertices,
                "paper_E": spec.paper_edges,
            }
        )
    return rows
