"""Connected components of the predicted-match graph.

Transitivity only matters within connected components of the graph whose
edges are pairs with matching probability > 0.5 (paper Section 4.3), so
both SIMPLE-EM's single-table model inference and the postprocessing
baselines need components.

Two implementations:

* ``connected_components`` — distributed Spark label propagation over an
  edge DataFrame (iterated min-label joins, localCheckpoint to keep the
  lineage flat). Used by jobs operating on full pair tables.
* ``components_unionfind`` — driver-side union-find over a numpy edge
  list. The E-step runs per EM iteration over the (small) predicted-match
  edge set on the driver, where union-find is the right tool. The Spark
  implementation is tested for equivalence against this one.
"""
from __future__ import annotations

import numpy as np
from pyspark.sql import DataFrame
from pyspark.sql import functions as F


def connected_components(edges: DataFrame, *, max_iter: int = 50) -> DataFrame:
    """(node, component) for the undirected graph given by (src, dst) rows.

    Component ids are the minimum node id in each component. Isolated
    nodes that never appear in ``edges`` are absent from the output.
    """
    sym = edges.select("src", "dst").union(
        edges.select(F.col("dst").alias("src"), F.col("src").alias("dst"))
    )
    labels = (
        sym.select(F.col("src").alias("node"))
        .distinct()
        .withColumn("component", F.col("node"))
    ).localCheckpoint()
    for _ in range(max_iter):
        # Candidate label for each node: min over its own and neighbors'.
        nbr = (
            sym.join(labels, sym.dst == labels.node)
            .select(F.col("src").alias("node"), "component")
        )
        new_labels = (
            labels.select("node", "component")
            .union(nbr)
            .groupBy("node")
            .agg(F.min("component").alias("component"))
        ).localCheckpoint()
        changed = (
            new_labels.alias("n")
            .join(labels.alias("o"), "node")
            .where(F.col("n.component") != F.col("o.component"))
            .limit(1)
            .count()
        )
        labels = new_labels
        if changed == 0:
            break
    return labels


def components_unionfind(
    src: np.ndarray, dst: np.ndarray
) -> dict[int, int]:
    """node → component (min node id) via union-find on the driver."""
    parent: dict[int, int] = {}

    def find(x: int) -> int:
        root = x
        while parent.get(root, root) != root:
            root = parent[root]
        while parent.get(x, x) != x:
            parent[x], x = root, parent[x]
        return root

    for a, b in zip(src.tolist(), dst.tolist()):
        parent.setdefault(a, a)
        parent.setdefault(b, b)
        ra, rb = find(a), find(b)
        if ra != rb:
            parent[max(ra, rb)] = min(ra, rb)
    return {x: find(x) for x in parent}
