"""EMcore [12] adapted baseline: top-down classical k_max-core.

The paper adapts EMcore to run in main memory and stop once the
k_max-core is found (§8, Table 4); it differs from CoreApp in its
block strategy (degree-threshold halving from d rather than top-W
doubling) and in using degrees as core-number upper bounds. Edge-based
cores only, as in Table 4.

Soundness of the schedule: every k-core with k >= t lies inside
H_t = {v : deg(v) >= t}, so if the peel of G[H_t] reaches k >= t that
value is the global k_max and its core is the global core; otherwise
the true k_max is < t and the threshold halves (EMcore's geometric
top-down bins — each block is decomposed in full before descending,
which is where its O(k_max (n+m)) vs CoreApp's O(n+m) shows up).
"""
from __future__ import annotations

import time

import numpy as np
import pandas as pd
from pyspark.sql import DataFrame, SparkSession

from repro.cores.kcore import core_numbers_peel, max_core_vertices
from repro.graph.ops import degrees, induced_subgraph


def kmax_core_emcore(spark: SparkSession, edges: DataFrame) -> tuple:
    """Returns (kmax, core_vertices, info) for classical (edge) cores."""
    t0 = time.perf_counter()
    deg_pdf = degrees(edges).toPandas()
    d = int(deg_pdf["deg"].max()) if len(deg_pdf) else 0
    rounds = 0
    t = max(1, d // 2)
    while True:
        rounds += 1
        hv = deg_pdf.loc[deg_pdf["deg"] >= t, "v"].to_numpy(np.int64)
        hdf = spark.createDataFrame(pd.DataFrame({"v": hv}))
        sub_pdf = induced_subgraph(edges, hdf).toPandas()
        core = core_numbers_peel(sub_pdf, all_vertices=hv)
        kmax_h, verts = max_core_vertices(core)
        if kmax_h >= t or t <= 1:
            info = {"rounds": rounds, "t_total": time.perf_counter() - t0}
            return kmax_h, verts, info
        t = max(1, t // 2)
