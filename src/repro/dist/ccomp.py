"""Connected components of the file-similarity graph.

Two interchangeable implementations (tests assert they agree):

- :func:`components_unionfind` -- driver-side union-find reference.
- :func:`components_spark` -- distributed label propagation over
  DataFrames: every node's label is iteratively replaced by the minimum
  label in its closed neighborhood until a fixpoint. Iteration count is
  bounded by the graph diameter; each round is one self-join + aggregate
  under Catalyst (no RDD usage).
"""
from __future__ import annotations

from pyspark.sql import DataFrame, SparkSession
from pyspark.sql import functions as F

from repro.core.segmentation import _UnionFind

__all__ = ["components_unionfind", "components_spark"]


def components_unionfind(
    nodes: list[str], edges: list[tuple[str, str]]
) -> dict[str, int]:
    """Reference: dense component labels (deterministic in sorted order)."""
    order = sorted(nodes)
    index = {n: i for i, n in enumerate(order)}
    uf = _UnionFind(len(order))
    for a, b in edges:
        uf.union(index[a], index[b])
    root_to_label: dict[int, int] = {}
    out: dict[str, int] = {}
    for n in order:
        r = uf.find(index[n])
        if r not in root_to_label:
            root_to_label[r] = len(root_to_label)
        out[n] = root_to_label[r]
    return out


def components_spark(
    spark: SparkSession,
    nodes: DataFrame,
    edges: DataFrame,
    *,
    max_iterations: int = 50,
) -> DataFrame:
    """Label propagation: returns ``(node, component)`` with string labels.

    ``nodes`` must have column ``node``; ``edges`` columns ``src, dst``
    (undirected; both orientations are added here). The component id is
    the lexicographically smallest node id in the component.
    """
    sym = (
        edges.select("src", "dst")
        .union(edges.select(F.col("dst").alias("src"), F.col("src").alias("dst")))
        .distinct()
    )
    labels = nodes.select("node", F.col("node").alias("component"))
    for _ in range(max_iterations):
        # Min label over the closed neighborhood of each node.
        neighbor_min = (
            sym.join(labels, sym.dst == labels.node)
            .groupBy("src")
            .agg(F.min("component").alias("nbr_component"))
        )
        updated = (
            labels.join(neighbor_min, labels.node == neighbor_min.src, "left")
            .select(
                "node",
                F.least(
                    F.col("component"), F.coalesce("nbr_component", F.col("component"))
                ).alias("component"),
            )
        )
        updated = updated.localCheckpoint(eager=True)  # cut the lineage per round
        changed = (
            updated.alias("u")
            .join(labels.alias("l"), "node")
            .where(F.col("u.component") != F.col("l.component"))
            .limit(1)
            .count()
        )
        labels = updated
        if changed == 0:
            break
    return labels
