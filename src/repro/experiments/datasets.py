"""The five evaluation datasets (Table I), scaled ~1/100, plus defaults.

Each paper dataset (KONECT: Youtube, Twitter, IMDB, Wiki-cat, DBLP) is
replaced by a synthetic planted-block affiliation graph whose |U| : |V|
ratio and average degree match the original at 1/100 linear scale (DESIGN.md
§3). Default parameters (alpha*/beta*/delta*/theta*) are scaled from the
paper's Table I so the default runs yield nontrivial result counts, mirroring
the paper's own "carefully fine-tune to extract meaningful fair bicliques".
"""
from __future__ import annotations

from dataclasses import dataclass
from functools import lru_cache

from repro.graph.bipartite import BipartiteGraph
from repro.graph.generators import PlantedSpec, planted_bipartite


@dataclass(frozen=True)
class DatasetSpec:
    """A Table I row: graph shape + per-model default parameters.

    ``alpha_s``/``beta_s`` are the SSFBC (and PSSFBC) defaults, ``alpha_b``/
    ``beta_b`` the BSFBC (PBSFBC) defaults; ``delta``/``theta`` are shared,
    as in the paper's Table I.
    """

    name: str
    paper_name: str
    spec: PlantedSpec
    seed: int
    alpha_s: int
    beta_s: int
    alpha_b: int
    beta_b: int
    delta: int
    theta: float


DATASETS: dict[str, DatasetSpec] = {
    d.name: d
    for d in [
        DatasetSpec(
            name="youtube-lite",
            paper_name="Youtube",
            spec=PlantedSpec(
                n_u=942, n_v=301, n_background=1400,
                n_blocks=15, block_u=12, block_v=12,
            ),
            seed=11,
            alpha_s=4, beta_s=4, alpha_b=3, beta_b=3, delta=2, theta=0.4,
        ),
        DatasetSpec(
            name="twitter-lite",
            paper_name="Twitter",
            spec=PlantedSpec(
                n_u=1752, n_v=5304, n_background=16500,
                n_blocks=20, block_u=14, block_v=14,
            ),
            seed=22,
            alpha_s=4, beta_s=4, alpha_b=3, beta_b=3, delta=2, theta=0.4,
        ),
        DatasetSpec(
            name="imdb-lite",
            paper_name="IMDB",
            spec=PlantedSpec(
                n_u=3036, n_v=8963, n_background=35000,
                n_blocks=25, block_u=16, block_v=16,
            ),
            seed=33,
            alpha_s=5, beta_s=5, alpha_b=4, beta_b=4, delta=2, theta=0.4,
        ),
        DatasetSpec(
            name="wikicat-lite",
            paper_name="Wiki-cat",
            spec=PlantedSpec(
                n_u=18535, n_v=1829, n_background=35000,
                n_blocks=25, block_u=14, block_v=14,
            ),
            seed=44,
            alpha_s=4, beta_s=4, alpha_b=3, beta_b=3, delta=2, theta=0.4,
        ),
        DatasetSpec(
            name="dblp-lite",
            paper_name="DBLP",
            spec=PlantedSpec(
                n_u=19531, n_v=56242, n_background=120000,
                n_blocks=25, block_u=12, block_v=12,
            ),
            seed=55,
            alpha_s=4, beta_s=4, alpha_b=2, beta_b=2, delta=2, theta=0.4,
        ),
    ]
}


@lru_cache(maxsize=None)
def load(name: str) -> BipartiteGraph:
    """Generate (and cache) a dataset graph by name."""
    d = DATASETS[name]
    return planted_bipartite(d.spec, seed=d.seed)


# Paper Table I reference values, for side-by-side reporting in EXPERIMENTS.md.
PAPER_TABLE1: dict[str, dict[str, float]] = {
    "Youtube": {"U": 94_238, "V": 30_087, "E": 293_360, "density": 1.0e-4},
    "Twitter": {"U": 175_214, "V": 530_418, "E": 1_890_661, "density": 2.0e-5},
    "IMDB": {"U": 303_617, "V": 896_302, "E": 3_782_463, "density": 1.4e-5},
    "Wiki-cat": {"U": 1_853_493, "V": 182_947, "E": 3_795_796, "density": 1.1e-5},
    "DBLP": {"U": 1_953_085, "V": 5_624_219, "E": 12_282_059, "density": 1.1e-6},
}
