"""Named synthetic stand-ins for the paper's 13 evaluation graphs.

The container has no network access, so every graph in Table 2 is
replaced by a deterministic synthetic equivalent that preserves the
structural property the experiments exercise: a power-law (or uniform,
for ER) background plus a small embedded dense core. Large graphs are
scaled down (factors recorded in DESIGN.md §2); small graphs match the
paper's |V| exactly.

Each entry returns a *pandas* edge frame via ``dataset_pandas`` and a
Spark DataFrame via ``dataset``. The embedded-blob vertex ids start at
0 so tests can assert their presence.
"""
from __future__ import annotations

import pandas as pd
from pyspark.sql import DataFrame, SparkSession

from repro.graph import generators as gen
from repro.graph.ops import edges_from_pandas

# name -> (builder, paper_n, paper_m, note)
_REGISTRY = {}


def _register(name, paper_n, paper_m, note):
    def deco(fn):
        _REGISTRY[name] = (fn, paper_n, paper_m, note)
        return fn

    return deco


@_register("s_dblp", 478, 1086, "case-study DBLP subgraph; CDS is K13")
def _s_dblp() -> pd.DataFrame:
    core = gen.clique_pandas(range(13))
    # 149-tail hub: 2-star density C(149,2)/150 = 73.5, the paper's
    # exact 2-star rho_opt for S-DBLP (a group-director vertex)
    hub = gen.biclique_pandas([13], range(100, 249))
    bg = gen.chung_lu_pandas(478, 800, alpha=2.4, seed=11)
    return gen.compose(core, hub, bg)


@_register("yeast", 1116, 2148, "PPI net; EDS edge-dense but clique-poor")
def _yeast() -> pd.DataFrame:
    # blobs live on HIGH vertex ids, where the rank-weighted background
    # almost never lands an edge — keeps the K9,9 EDS triangle-free
    # (the paper's Yeast EDS has near-zero clique densities, Table 5)
    biclique = gen.biclique_pandas(range(800, 809), range(809, 818))
    tri_blob = gen.clique_pandas(range(830, 835))  # K5: small triangle CDS
    hub = gen.biclique_pandas([850], range(851, 1016))  # 2-star PDS hub
    bg = gen.chung_lu_pandas(1116, 1850, alpha=3.0, seed=13, offset=0)
    return gen.compose(biclique, tri_blob, hub, bg)


@_register("netscience", 1589, 2742, "collaboration net; CDS is K20")
def _netscience() -> pd.DataFrame:
    core = gen.clique_pandas(range(20))
    bg = gen.chung_lu_pandas(1589, 2550, alpha=2.4, seed=17)
    return gen.compose(core, bg)


@_register("as733", 1486, 3172, "AS topology; hubs + ER(24,0.8) blob")
def _as733() -> pd.DataFrame:
    blob = gen.erdos_renyi_pandas(24, 0.8, seed=19, offset=0)
    bg = gen.chung_lu_pandas(1486, 2900, alpha=2.2, seed=19)
    return gen.compose(blob, bg)


@_register("ca_hepth", 9877, 25998, "collab net; K18 (paper: 32-author clique)")
def _ca_hepth() -> pd.DataFrame:
    core = gen.clique_pandas(range(18))
    bg = gen.chung_lu_pandas(9877, 25800, alpha=2.6, seed=23)
    return gen.compose(core, bg)


@_register("as_caida", 26475, 106762, "AS topology; hubs + ER(40,0.6) blob")
def _as_caida() -> pd.DataFrame:
    blob = gen.erdos_renyi_pandas(40, 0.6, seed=29, offset=0)
    bg = gen.chung_lu_pandas(26475, 106200, alpha=2.3, seed=29)
    return gen.compose(blob, bg)


@_register("dblp_s", 425957, 1049866, "1/50 scale; embedded K24")
def _dblp_s() -> pd.DataFrame:
    core = gen.clique_pandas(range(24))
    bg = gen.chung_lu_pandas(8519, 20700, alpha=2.35, seed=31)
    return gen.compose(core, bg)


@_register("cit_patents_s", 3774768, 16518948, "1/100 scale; embedded K30")
def _cit_patents_s() -> pd.DataFrame:
    core = gen.clique_pandas(range(30))
    bg = gen.chung_lu_pandas(37747, 164700, alpha=2.28, seed=37)
    return gen.compose(core, bg)


@_register("friendster_s", 20145325, 106570765, "1/500 scale; embedded K40")
def _friendster_s() -> pd.DataFrame:
    core = gen.clique_pandas(range(40))
    bg = gen.chung_lu_pandas(40290, 212300, alpha=2.45, seed=41)
    return gen.compose(core, bg)


@_register("enwiki_s", 5409498, 122008994, "1/500 scale; embedded K35")
def _enwiki_s() -> pd.DataFrame:
    core = gen.clique_pandas(range(35))
    bg = gen.chung_lu_pandas(10818, 243400, alpha=2.44, seed=43)
    return gen.compose(core, bg)


@_register("uk2002_s", 18520486, 298113762, "1/1000 scale; embedded K45")
def _uk2002_s() -> pd.DataFrame:
    core = gen.clique_pandas(range(45))
    bg = gen.chung_lu_pandas(18520, 297100, alpha=2.5, seed=47)
    return gen.compose(core, bg)


@_register("ssca_s", 100000, 3405676, "1/10 scale; random cliques <= 15")
def _ssca_s() -> pd.DataFrame:
    return gen.ssca_pandas(10000, 15, seed=53)


@_register("er_s", 100000, 4837534, "1/10 scale; uniform degrees")
def _er_s() -> pd.DataFrame:
    return gen.erdos_renyi_pandas(10000, 0.001, seed=59)


@_register("rmat_s", 100000, 2571986, "1/10 scale; power-law R-MAT")
def _rmat_s() -> pd.DataFrame:
    return gen.rmat_pandas(14, 50000, seed=61)


SMALL = ("yeast", "netscience", "as733", "ca_hepth", "as_caida")
LARGE = ("dblp_s", "cit_patents_s", "friendster_s", "enwiki_s", "uk2002_s")
SYNTH = ("ssca_s", "er_s", "rmat_s")
CASE_STUDY = ("s_dblp",)
ALL = CASE_STUDY + SMALL + LARGE + SYNTH


def names() -> tuple:
    return ALL


def paper_size(name: str) -> tuple:
    """(paper_n, paper_m) as reported in Table 2 / §8.2 of the paper."""
    _, n, m, _ = _REGISTRY[name]
    return n, m


def note(name: str) -> str:
    return _REGISTRY[name][3]


def dataset_pandas(name: str) -> pd.DataFrame:
    """Deterministic canonical edge frame for a named stand-in."""
    return _REGISTRY[name][0]()


def dataset(spark: SparkSession, name: str) -> DataFrame:
    return edges_from_pandas(spark, dataset_pandas(name))
