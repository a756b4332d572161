"""Ad-hoc smoke test for the core pipeline (dev-time only)."""
import os
import sys

sys.path.insert(0, "/root/repo")
import conftest  # noqa: F401  (sets PYSPARK_SUBMIT_ARGS pre-import)

from pyspark.sql import SparkSession

spark = (
    SparkSession.builder.appName("smoke")
    .config("spark.sql.shuffle.partitions", "8")
    .config("spark.sql.autoBroadcastJoinThreshold", -1)
    .getOrCreate()
)
spark.sparkContext.setLogLevel("ERROR")

import numpy as np
import pandas as pd

from repro.graph import generators as gen
from repro.graph.ops import edges_from_pandas, degrees
from repro.cliques.enumerate import clique_instances, clique_degrees
from repro.patterns import clique, diamond, star, two_triangle, generic, c3_star
from repro.patterns.instances import pattern_instances, count_pattern
from repro.cores.kcore import core_numbers, core_numbers_peel, k_core
from repro.cores.clique_core import (
    clique_core_numbers_hindex,
    peel_decompose,
    collect_instances,
)
from repro.densest.exact import exact_densest
from repro.densest.core_exact import core_exact
from repro.densest.peel import peel_app
from repro.densest.bruteforce import brute_force_densest
from repro.densest.common import gather

# --- K6 sanity
k6 = edges_from_pandas(spark, gen.clique_pandas(range(6)))
from math import comb

for h in (2, 3, 4, 5, 6):
    cnt = clique_instances(spark, k6, h).count()
    assert cnt == comb(6, h), (h, cnt)
print("clique counts on K6 OK")

assert count_pattern(spark, k6, diamond()) == 3 * comb(6, 4), "C4 in K6"
assert count_pattern(spark, k6, star(2)) == 6 * comb(5, 2)
assert count_pattern(spark, k6, two_triangle()) == comb(6, 4) * 6
p_path3 = generic("p3", 3, [(0, 1), (1, 2)])
assert count_pattern(spark, k6, p_path3) == 6 * comb(5, 2), "generic 2-star"
print("pattern counts on K6 OK")

# --- core numbers on a random graph
pdf = gen.erdos_renyi_pandas(30, 0.2, seed=7)
g = edges_from_pandas(spark, pdf)
cn_d = {r["v"]: r["core"] for r in core_numbers(g).collect()}
cn_p = core_numbers_peel(pdf)
assert cn_d == cn_p, "h-index vs peel mismatch"
print("classical core numbers OK", max(cn_p.values()))

# --- clique core numbers: distributed vs peel
tri = clique(3)
inst = pattern_instances(spark, g, tri)
cn_h = {r["v"]: r["core"] for r in clique_core_numbers_hindex(spark, g, tri, inst=inst).collect()}
members = collect_instances(inst, tri)
allv = sorted(set(pdf["src"]) | set(pdf["dst"]))
pr = peel_decompose(members, allv)
assert cn_h == pr.core, (cn_h, pr.core)
print("clique core numbers OK, kmax =", pr.kmax)

# --- exact vs brute force on small graph
pdf2 = gen.erdos_renyi_pandas(12, 0.35, seed=3)
g2 = edges_from_pandas(spark, pdf2)
for pat in (clique(2), clique(3), star(2), diamond()):
    allv2, mem2 = gather(spark, g2, pat)
    bf_set, bf_d = brute_force_densest(mem2, allv2)
    r1 = exact_densest(spark, g2, pat)
    r2 = core_exact(spark, g2, pat)
    r3 = peel_app(spark, g2, pat)
    assert abs(r1.density - bf_d) < 1e-9, (pat.name, r1.density, bf_d)
    assert abs(r2.density - bf_d) < 1e-9, (pat.name, r2.density, bf_d)
    assert r3.density >= bf_d / pat.nv - 1e-9
    print(f"exact {pat.name}: density {bf_d:.4f} OK (peel {r3.density:.4f})")

print("ALL SMOKE OK")
spark.stop()
