"""Mini-scale analogues of the paper's datasets (Table 1).

Counts and lengths are shrunk to laptop scale while preserving the
paper's relative ordering (lengths scaled ~4x down, counts to thousands);
"clustered" datasets model the density skew and acquisition-order layout
of the real sets (Seismic/Astro/Yan-TtI), "walk" models Random/Deep/Sift.
Generation is deterministic in the seed.
"""
from dataclasses import dataclass

import numpy as np

from ..synth_data import clustered_walks_np, random_walk_np


@dataclass(frozen=True)
class DatasetSpec:
    name: str
    kind: str  # "walk" | "clustered"
    base_n: int  # series count at sf=1 (bench scale)
    length: int
    seed: int
    paper_series: str
    paper_length: int
    paper_gb: str
    description: str

    def generate(self, sf: float = 1.0, *, seed: int | None = None) -> np.ndarray:
        n = max(16, int(self.base_n * sf))
        s = self.seed if seed is None else seed
        if self.kind == "walk":
            return random_walk_np(n, self.length, seed=s)
        return clustered_walks_np(n, self.length, seed=s)

    def size_mb(self, sf: float = 1.0) -> float:
        n = max(16, int(self.base_n * sf))
        return n * self.length * 4 / 1e6  # float32 on disk, as in the paper


DATASETS: dict[str, DatasetSpec] = {
    "seismic": DatasetSpec("Seismic", "clustered", 6000, 64, 11, "100M", 256, "100", "seismic records (clustered walks)"),
    "astro": DatasetSpec("Astro", "clustered", 8000, 64, 12, "270M", 256, "265", "astronomical data (clustered walks)"),
    "deep": DatasetSpec("Deep", "walk", 10000, 24, 13, "1B", 96, "358", "deep embeddings (walks)"),
    "sift": DatasetSpec("Sift", "walk", 10000, 32, 14, "1B", 128, "477", "image descriptors (walks)"),
    "yantti": DatasetSpec("Yan-TtI", "clustered", 8000, 48, 15, "1B", 200, "800", "image+text embeddings (clustered walks)"),
    "random": DatasetSpec("Random", "walk", 6000, 64, 16, "100M-1600M", 256, "100-1600", "random walks"),
}
