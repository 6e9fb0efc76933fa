"""Registry of synthetic analogs of the paper's Table 1 datasets.

Each of the 9 public graphs Motivo is evaluated on (Table 1) maps to a
deterministic generator reproducing its structural signature at roughly
1/50,000 of the original size (see DESIGN.md §3 for the substitution
rationale). ``paper_*`` fields record the original table row so the
Table 1 reproduction can print paper-vs-ours side by side.
"""
from __future__ import annotations

from dataclasses import dataclass
from typing import Callable

from . import generators as gen


@dataclass(frozen=True)
class DatasetSpec:
    name: str
    paper_mnodes: float  #: millions of nodes in the paper's graph
    paper_medges: float  #: millions of edges in the paper's graph
    paper_source: str
    paper_max_k: str  #: largest k the paper ran (with * = biased coloring)
    signature: str  #: the structural trait the analog reproduces
    build: Callable[[], gen.Graph]

    def graph(self) -> gen.Graph:
        g = self.build()
        return gen.Graph(self.name, g.edge_array)


DATASETS: dict[str, DatasetSpec] = {
    spec.name: spec
    for spec in [
        DatasetSpec(
            "facebook",
            0.1, 0.8, "MPI-SWS", "9",
            "dense social graph, heavy-tailed degrees, flat graphlet dist.",
            lambda: gen.ba_graph(2000, 8, seed=11),
        ),
        DatasetSpec(
            "berkstan",
            0.7, 6.6, "SNAP", "9",
            "web graph with outlier hubs (degree >> rest; §3.2 buffering)",
            lambda: gen.hub_graph(3000, 18000, 2, 1200, seed=12),
        ),
        DatasetSpec(
            "amazon",
            0.7, 3.5, "SNAP", "9",
            "low-degree clustered co-purchase communities",
            lambda: gen.community_graph(3500, 35, 5.0, 1500, seed=13),
        ),
        DatasetSpec(
            "dblp",
            0.9, 3.4, "SNAP", "9",
            "low-degree clustered co-authorship communities",
            lambda: gen.community_graph(4000, 50, 3.8, 1200, seed=14),
        ),
        DatasetSpec(
            "orkut",
            3.1, 117.2, "MPI-SWS", "7",
            "very dense social graph (avg degree ~76)",
            lambda: gen.ba_graph(3000, 38, seed=15),
        ),
        DatasetSpec(
            "livejournal",
            5.4, 49.5, "LAW", "8",
            "large social graph, moderate density",
            lambda: gen.ba_graph(5000, 9, seed=16),
        ),
        DatasetSpec(
            "yelp",
            7.2, 26.1, "YLP", "8",
            "star-dominated review graph (>99.999% of graphlets are stars)",
            lambda: gen.star_heavy_graph(50, 120, 800, seed=17),
        ),
        DatasetSpec(
            "twitter",
            41.7, 1202.5, "LAW", "6 (7*)",
            "massive dense follower graph (biased-coloring target)",
            lambda: gen.ba_graph(8000, 28, seed=18),
        ),
        DatasetSpec(
            "friendster",
            65.6, 1806.1, "SNAP", "6 (7*)",
            "largest graph; biased-coloring target (§3.4)",
            lambda: gen.ba_graph(10000, 25, seed=19),
        ),
    ]
}

#: Graphs on which the paper's CC baseline ran at all (Twitter and
#: Friendster are excluded from the §5.1 comparison tables: "CC failed
#: even for k=5").
CC_COMPARISON_GRAPHS = [
    "facebook", "berkstan", "amazon", "dblp", "orkut", "livejournal", "yelp",
]


def load(name: str) -> gen.Graph:
    """Build the named dataset analog (deterministic)."""
    return DATASETS[name].graph()
