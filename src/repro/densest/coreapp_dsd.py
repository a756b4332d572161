"""CoreApp as a DSD algorithm: return the (k_max, Psi)-core (Lemma 9:
a 1/|V_Psi|-approximation), found top-down without full decomposition."""
from __future__ import annotations

import time

import pandas as pd
from pyspark.sql import DataFrame, SparkSession

from repro.cores.clique_core import collect_instances
from repro.cores.coreapp import kmax_core_coreapp
from repro.densest.common import DSDResult
from repro.graph.ops import induced_subgraph, vertices as graph_vertices
from repro.patterns.base import Pattern
from repro.patterns.instances import pattern_instances


def core_app(
    spark: SparkSession, edges: DataFrame, pattern: Pattern, w0: int | None = None
) -> DSDResult:
    t0 = time.perf_counter()
    kmax, verts, info = kmax_core_coreapp(spark, edges, pattern, w0=w0)
    t_core = time.perf_counter() - t0
    if not verts:
        verts = [int(r["v"]) for r in graph_vertices(edges).limit(1).collect()]
    # exact density of the returned core: enumerate Psi inside it (it is small)
    vdf = spark.createDataFrame(pd.DataFrame({"v": verts}))
    sub = induced_subgraph(edges, vdf)
    mu = pattern_instances(spark, sub, pattern).count()
    dens = mu / len(verts) if verts else 0.0
    return DSDResult(
        "CoreApp",
        pattern.name,
        sorted(verts),
        dens,
        kmax=kmax,
        timings={"core": t_core, "total": time.perf_counter() - t0},
        stats=info,
    )
