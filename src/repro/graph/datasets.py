"""Synthetic stand-ins for the paper's 19 real graphs (Table 1).

The paper's datasets come from networkrepository.com (up to 543M
edges); this container is offline, so each graph is replaced by a
deterministic synthetic graph from `generators` whose *structural
class* matches the role the real graph plays in the evaluation
(DESIGN.md §4):

* small-ω group — power-law / community graphs: k is swept from 4 all
  the way to ω;
* large-ω group — sparse backgrounds with planted cliques (ω ≈ δ ≈ τ+2):
  k is swept over small values and values near ω, exactly as in the
  paper ("we only list k-cliques for small k values and large k values
  which are near ω").

``PAPER_STATS`` records the published Table 1 row for each graph so
EXPERIMENTS.md can print paper-vs-ours side by side. The paper's four
default datasets WK / PO / ST / OR keep that role here.
"""
from __future__ import annotations

from dataclasses import dataclass
from functools import lru_cache
from typing import Callable

from . import generators as G
from .loader import LocalGraph


@dataclass(frozen=True)
class PaperStats:
    """The published Table 1 row (for side-by-side reporting)."""

    n: int
    m: int
    max_deg: int
    delta: int
    tau: int
    omega: int


@dataclass(frozen=True)
class DatasetSpec:
    """One substitute graph: where it came from and how we rebuilt it."""

    name: str
    paper_name: str
    group: str  # "small" (small-ω) or "large" (large-ω)
    build: Callable[[], LocalGraph]
    paper: PaperStats


def _spec(name, paper_name, group, build, stats) -> DatasetSpec:
    return DatasetSpec(
        name=name, paper_name=paper_name, group=group, build=build,
        paper=PaperStats(*stats),
    )


DATASETS: dict[str, DatasetSpec] = {
    s.name: s
    for s in [
        # ---- small-ω group (paper Figure 4) --------------------------------
        _spec("na", "nasasrb", "small",
              lambda: G.ring_of_cliques(50, 10, extra_p=0.003, seed=101),
              (54_870, 1_311_227, 275, 35, 22, 24)),
        _spec("fb", "fbwosn", "small",
              lambda: G.barabasi_albert(1500, 10, seed=102),
              (63_731, 817_090, 2_000, 52, 35, 30)),
        _spec("wk", "wikitrust", "small",
              lambda: G.planted_cliques(1200, 0.008, [12, 10, 10], seed=103),
              (138_587, 715_883, 12_000, 64, 31, 25)),
        _spec("sh", "shipsec5", "small",
              lambda: G.ring_of_cliques(80, 8, extra_p=0.002, seed=104),
              (179_104, 2_200_076, 75, 29, 22, 24)),
        _spec("so", "socfba", "small",
              lambda: G.barabasi_albert(2500, 12, seed=105),
              (3_097_165, 23_667_394, 5_000, 74, 29, 25)),
        _spec("po", "pokec", "small",
              lambda: G.planted_cliques(2000, 0.006, [13, 11, 10, 9], seed=106),
              (1_632_803, 22_301_964, 15_000, 47, 27, 29)),
        _spec("cn", "wikicn", "small",
              lambda: G.chung_lu(2500, gamma=2.2, avg_deg=10, seed=107),
              (1_930_270, 8_956_902, 30_000, 127, 31, 33)),
        _spec("ba", "baidu", "small",
              lambda: G.barabasi_albert(2200, 8, seed=108),
              (2_140_198, 17_014_946, 98_000, 82, 29, 31)),
        # ---- large-ω group (paper Figure 5) --------------------------------
        _spec("we", "websk", "large",
              lambda: G.planted_cliques(400, 0.010, [24, 15], seed=109),
              (121_422, 334_419, 590, 81, 80, 82)),
        _spec("ci", "citeseer", "large",
              lambda: G.planted_cliques(600, 0.008, [26, 16], seed=110),
              (227_320, 814_134, 1_000, 86, 85, 87)),
        _spec("st", "stanford", "large",
              lambda: G.planted_cliques(800, 0.008, [30, 18, 14], seed=111),
              (281_904, 1_992_636, 39_000, 86, 61, 61)),
        _spec("db", "dblp", "large",
              lambda: G.planted_cliques(900, 0.006, [34, 20], seed=112),
              (317_080, 1_049_866, 343, 113, 112, 114)),
        _spec("de", "dielfilter", "large",
              lambda: G.planted_cliques(1200, 0.010, [28, 20, 16], seed=113),
              (420_408, 16_232_900, 302, 56, 43, 45)),
        _spec("dg", "digg", "large",
              lambda: G.planted_cliques(1500, 0.008, [26, 18], seed=114),
              (770_799, 5_907_132, 18_000, 236, 72, 50)),
        _spec("sk", "skitter", "large",
              lambda: G.planted_cliques(1800, 0.006, [30, 20], seed=115),
              (1_696_415, 11_095_298, 35_000, 111, 67, 67)),
        _spec("or", "orkut", "large",
              lambda: G.planted_cliques(2500, 0.006, [32, 22, 18], seed=116),
              (2_997_166, 106_349_209, 28_000, 253, 74, 47)),
        _spec("uk", "allwebuk", "large",
              lambda: G.planted_cliques(3500, 0.004, [40, 30], seed=117),
              (18_483_186, 261_787_258, 3_000_000, 943, 942, 944)),
        _spec("cw", "clueweb", "large",
              lambda: G.planted_cliques(5000, 0.002, [36], seed=118),
              (147_925_593, 446_766_953, 1_000_000, 192, 83, 56)),
        _spec("wp", "wikipedia", "large",
              lambda: G.planted_cliques(6000, 0.002, [44, 32], seed=119),
              (25_921_548, 543_183_611, 4_000_000, 1120, 426, 428)),
    ]
}

DEFAULT_DATASETS = ("wk", "po", "st", "or")
SMALL_OMEGA = tuple(n for n, s in DATASETS.items() if s.group == "small")
LARGE_OMEGA = tuple(n for n, s in DATASETS.items() if s.group == "large")
SCALABILITY = ("uk", "cw", "wp")


@lru_cache(maxsize=32)
def load(name: str) -> LocalGraph:
    """Build (and cache) a dataset's graph. Deterministic in the spec seed."""
    return DATASETS[name].build()
