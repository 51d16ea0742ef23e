"""Scaled-down replicas of the paper's Table-2 datasets.

The paper's datasets span 300–10 002 versions with 20K–100K records per
version (30 GB–1 TB). We preserve every *shape* knob — graph kind
(chain vs branched), relative depth, update percentage, update skew,
record size class — and scale counts ~1/100 so each dataset generates in
seconds and all nine evaluation tables run on one machine (DESIGN §2).

``make(name)`` returns a :class:`VersionedDataset`; ``TEST_SCALE`` shrinks
everything a further 5× for unit tests.
"""
from __future__ import annotations

from dataclasses import dataclass

from .generator import VersionedDataset, generate
from .graph import VersionGraph, chain, random_tree


@dataclass(frozen=True)
class DatasetSpec:
    """Knobs for one Table-2-like dataset (scaled)."""

    name: str
    paper_name: str
    kind: str              # "chain" | "tree"
    n_versions: int
    deepen_prob: float     # tree depth knob (ignored for chains)
    n_base: int            # ≈ records per version
    pct_update: float
    update_type: str       # "random" | "zipf"
    record_size: int = 100
    seed: int = 7

    def graph(self, scale: float = 1.0) -> VersionGraph:
        n = max(3, int(self.n_versions * scale))
        if self.kind == "chain":
            return chain(n)
        return random_tree(n, deepen_prob=self.deepen_prob, seed=self.seed)


# Scaled counterparts of Table 2 (paper values in comments:
# versions / avg depth / records-per-version / %update / type).
SPECS: dict[str, DatasetSpec] = {s.name: s for s in [
    DatasetSpec("A0s", "A0", "chain", 100, 1.0, 1000, 50, "random"),  # 300/300/100K/50/rand
    DatasetSpec("A1s", "A1", "chain", 100, 1.0, 1000, 5, "zipf"),     # 300/300/100K/5/skew
    DatasetSpec("A2s", "A2", "chain", 100, 1.0, 1000, 5, "random"),   # 300/300/100K/5/rand
    DatasetSpec("B0s", "B0", "tree", 250, 0.985, 1000, 5, "zipf"),    # 1001/293.5/100K/5/skew
    DatasetSpec("B1s", "B1", "tree", 250, 0.985, 1000, 5, "random"),  # 1001/293.5/100K/5/rand
    DatasetSpec("B2s", "B2", "tree", 250, 0.985, 1000, 10, "random"), # 1001/293.5/100K/10/rand
    DatasetSpec("C0s", "C0", "tree", 500, 0.93, 200, 10, "random"),   # 10001/143/20K/10/rand
    DatasetSpec("C1s", "C1", "tree", 500, 0.93, 200, 1, "random"),    # 10001/143/20K/1/rand
    DatasetSpec("C2s", "C2", "tree", 500, 0.93, 200, 5, "zipf"),      # 10001/143/20K/5/skew
    DatasetSpec("D0s", "D0", "tree", 500, 0.85, 200, 10, "random"),   # 10002/94.4/20K/10/rand
    DatasetSpec("D1s", "D1", "tree", 500, 0.85, 200, 1, "random"),    # 10002/94.4/20K/1/rand
    DatasetSpec("D2s", "D2", "tree", 500, 0.85, 200, 5, "zipf"),      # 10002/94.4/20K/5/skew
    DatasetSpec("Es", "E", "tree", 500, 0.90, 200, 10, "random", 500),# 10001/170/20K/10/rand, big recs
    DatasetSpec("Fs", "F", "tree", 250, 0.80, 1000, 20, "random", 500),# 1001/56/100K/20/rand, big recs
]}

# The subset plotted in most figures; used by default in span experiments.
CORE_NAMES = ["A0s", "A1s", "A2s", "B0s", "B1s", "B2s",
              "C0s", "C1s", "C2s", "D0s", "D1s", "D2s"]

TEST_SCALE = 0.2


def make(name: str, *, scale: float = 1.0, with_payload: bool = False,
         p_d: float = 0.1) -> VersionedDataset:
    """Generate the scaled dataset ``name`` (see ``SPECS``).

    ``with_payload`` materializes record payloads (needed only by the
    compression experiments); span experiments run on sizes alone.
    """
    spec = SPECS[name]
    g = spec.graph(scale)
    n_base = max(10, int(spec.n_base * (1 if scale >= 1 else scale * 2)))
    ds = generate(g, n_base=n_base, pct_update=spec.pct_update,
                  update_type=spec.update_type, record_size=spec.record_size,
                  p_d=p_d, with_payload=with_payload, seed=spec.seed)
    ds.config["name"] = name
    ds.config["paper_name"] = spec.paper_name
    return ds
