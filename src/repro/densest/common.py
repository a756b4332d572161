"""Shared result type and helpers for the DSD/PDS algorithms."""
from __future__ import annotations

from dataclasses import dataclass, field

import numpy as np
from pyspark.sql import DataFrame, SparkSession

from repro.cores.clique_core import collect_instances, density_of
from repro.graph.ops import vertices as graph_vertices
from repro.patterns.base import Pattern
from repro.patterns.instances import pattern_instances


@dataclass
class DSDResult:
    """Outcome of a densest-subgraph algorithm run."""

    algorithm: str
    pattern: str
    vertices: list  # the returned subgraph's vertex set
    density: float  # its exact Psi-density
    kmax: int | None = None
    timings: dict = field(default_factory=dict)  # seconds per phase
    stats: dict = field(default_factory=dict)

    @property
    def size(self) -> int:
        return len(self.vertices)


def gather(
    spark: SparkSession,
    edges: DataFrame,
    pattern: Pattern,
    inst: DataFrame | None = None,
) -> tuple:
    """(all_vertex_ids, member_matrix) — the driver-side problem instance."""
    if inst is None:
        inst = pattern_instances(spark, edges, pattern)
    members = collect_instances(inst, pattern)
    allv = [int(r["v"]) for r in graph_vertices(edges).collect()]
    return allv, members


def exact_density(members: np.ndarray, vertex_set) -> float:
    return density_of(members, set(vertex_set))
