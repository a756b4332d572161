"""h-clique enumeration as Catalyst dataflow.

This is the DataFrame rendition of the kClist idea (Danisch et al.,
WWW'18, the paper's clique enumerator [15]): orient every edge from the
endpoint with the smaller ``(degree, id)`` rank to the larger one. The
result is a DAG whose out-degrees are bounded by the graph degeneracy,
and every h-clique appears exactly once as an h-path-closed tuple
``v1 < v2 < ... < vh`` in rank order with all C(h,2) oriented edges
present. Level h is built from level h-1 with one extension join plus
h-2 membership joins — all equi-joins Catalyst can shuffle-plan.
"""
from __future__ import annotations

from pyspark.sql import DataFrame, SparkSession, functions as F

from repro.graph.ops import degrees, symmetrize


def oriented_edges(edges: DataFrame) -> DataFrame:
    """Degree-ordered orientation — columns (a, b), rank(a) < rank(b).

    rank(v) = (deg(v), v): ties broken by id, so the orientation is a
    total order and acyclic.
    """
    deg = degrees(edges)
    sym = symmetrize(edges)
    ranked = (
        sym.join(deg.withColumnRenamed("v", "u").withColumnRenamed("deg", "du"), "u")
        .join(deg.withColumnRenamed("deg", "dv"), "v")
        .where(
            (F.col("du") < F.col("dv"))
            | ((F.col("du") == F.col("dv")) & (F.col("u") < F.col("v")))
        )
    )
    return ranked.select(F.col("u").alias("a"), F.col("v").alias("b"))


def clique_instances(spark: SparkSession, edges: DataFrame, h: int) -> DataFrame:
    """All h-clique instances — columns v1..vh (rank order), one row each.

    h=1 returns the vertex set; h=2 the edges. Each instance appears
    exactly once because tuples follow the orientation's total order.
    """
    if h < 1:
        raise ValueError("h must be >= 1")
    if h == 1:
        from repro.graph.ops import vertices

        return vertices(edges).select(F.col("v").alias("v1"))
    dag = oriented_edges(edges).localCheckpoint(eager=True)
    cur = dag.select(F.col("a").alias("v1"), F.col("b").alias("v2"))
    for k in range(3, h + 1):
        last = f"v{k - 1}"
        ext = dag.select(F.col("a").alias(last), F.col("b").alias(f"v{k}"))
        cur = cur.join(ext, last)
        # membership joins: (vi, vk) must be an oriented edge for i < k-1
        for i in range(1, k - 1):
            chk = dag.select(F.col("a").alias(f"v{i}"), F.col("b").alias(f"v{k}"))
            cur = cur.join(chk, [f"v{i}", f"v{k}"], "left_semi")
        cur = cur.select(*[f"v{j}" for j in range(1, k + 1)])
        cur = cur.localCheckpoint(eager=True)
    return cur


def instances_long(instances: DataFrame) -> DataFrame:
    """(iid, v) long form of an instance DataFrame with columns v1..vh.

    iid is a deterministic 64-bit hash of the member tuple — stable
    across partitions, unique with overwhelming probability at the
    scales used here (xxhash64 over the sorted member array).
    """
    cols = [c for c in instances.columns if c.startswith("v")]
    with_id = instances.withColumn("iid", F.xxhash64(*cols))
    stacked = with_id.select(
        "iid", F.explode(F.array(*cols)).alias("v")
    )
    return stacked


def clique_degrees(spark: SparkSession, edges: DataFrame, h: int) -> DataFrame:
    """Clique-degree deg_G(v, Psi) per vertex — columns (v, cdeg).

    Vertices in no h-clique are absent (treat as 0).
    """
    inst = clique_instances(spark, edges, h)
    return instances_long(inst).groupBy("v").agg(F.count("*").alias("cdeg"))


def count_instances(spark: SparkSession, edges: DataFrame, h: int) -> int:
    """mu(G, Psi) for Psi = h-clique."""
    return clique_instances(spark, edges, h).count()
