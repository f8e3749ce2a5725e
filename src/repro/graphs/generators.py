"""Synthetic graph generators standing in for the paper's Table 4 datasets.

The paper evaluates on seven real-world graphs (SNAP/KONECT) plus one huge
RMAT graph. None are downloadable here, so each is replaced by a seeded
RMAT graph scaled to ``scale`` x the paper's vertex count while preserving
the paper's average degree and a skew profile chosen per graph *type*
(social graphs are more skewed than folksonomy graphs). Redundancy
behaviour (updates/vertex, early-converged fraction) is driven by degree
skew and small-world distance structure, both of which RMAT reproduces at
small scale — see DESIGN.md "Known deviations".

Everything is deterministic in the seed so the NumPy/DuckDB oracles see
identical input.
"""
from __future__ import annotations

from dataclasses import dataclass

import numpy as np
import pandas as pd

# RMAT quadrant probabilities per graph type. Larger `a` => more skew.
_SKEW = {
    "social": (0.57, 0.19, 0.19, 0.05),
    "hyperlink": (0.60, 0.18, 0.18, 0.04),
    "folksonomy": (0.45, 0.22, 0.22, 0.11),
    "rmat": (0.57, 0.19, 0.19, 0.05),
}


@dataclass(frozen=True)
class GraphSpec:
    """One row of the paper's Table 4."""

    name: str
    paper_vertices: int
    paper_edges: int
    kind: str  # skew profile key
    seed: int

    def sized(self, scale: float) -> tuple[int, int]:
        """(num_vertices, num_edges) at ``scale``, preserving avg degree."""
        v = max(16, int(self.paper_vertices * scale))
        avg_deg = self.paper_edges / self.paper_vertices
        e = max(v, int(v * avg_deg))
        return v, e


# Table 4 of the paper. |V| and |E| are the paper's figures.
GRAPHS: dict[str, GraphSpec] = {
    "PK": GraphSpec("PK", 1_600_000, 30_600_000, "social", 11),
    "OK": GraphSpec("OK", 3_100_000, 117_200_000, "social", 12),
    "LJ": GraphSpec("LJ", 4_800_000, 69_000_000, "social", 13),
    "WK": GraphSpec("WK", 12_100_000, 378_100_000, "hyperlink", 14),
    "DI": GraphSpec("DI", 33_800_000, 301_200_000, "folksonomy", 15),
    "ST": GraphSpec("ST", 11_300_000, 85_300_000, "social", 16),
    "FS": GraphSpec("FS", 65_600_000, 1_800_000_000, "social", 17),
    "RMAT": GraphSpec("RMAT", 300_000_000, 10_000_000_000, "rmat", 18),
}


def rmat_edges(
    num_vertices: int,
    num_edges: int,
    *,
    seed: int = 0,
    abcd: tuple[float, float, float, float] = _SKEW["social"],
) -> pd.DataFrame:
    """Vectorised RMAT edge sampler (Chakrabarti et al.), deduplicated.

    Returns a pandas frame with columns ``src``, ``dst`` (int64 in
    ``[0, num_vertices)``) and no self-loops or duplicate edges. Oversamples
    then trims so the returned edge count equals ``num_edges`` whenever the
    graph is sparse enough to allow it.
    """
    a, b, c, d = abcd
    levels = max(1, int(np.ceil(np.log2(max(2, num_vertices)))))
    g = np.random.default_rng(seed)
    want = num_edges
    src_parts: list[np.ndarray] = []
    dst_parts: list[np.ndarray] = []
    seen = np.empty(0, dtype=np.int64)
    # Oversampling rounds absorb dedup/self-loop losses; at very small
    # scales the hot quadrants run out of distinct pairs, so later rounds
    # oversample more aggressively. A small shortfall (<~3%) can remain.
    for rnd in range(12):
        n = int(want * (1.3 + 0.7 * rnd)) + 64
        src = np.zeros(n, dtype=np.int64)
        dst = np.zeros(n, dtype=np.int64)
        for _lvl in range(levels):
            r = g.random(n)
            # quadrants: a=(0,0) b=(0,1) c=(1,0) d=(1,1); p(row=1)=c+d.
            row = (r >= a + b).astype(np.int64)
            col = np.where(
                row == 0,
                (r >= a).astype(np.int64),
                (r >= a + b + c).astype(np.int64),
            )
            src = src * 2 + row
            dst = dst * 2 + col
        src %= num_vertices
        dst %= num_vertices
        keep = src != dst
        src, dst = src[keep], dst[keep]
        key = src * num_vertices + dst
        key, idx = np.unique(key, return_index=True)
        new = ~np.isin(key, seen)
        src_parts.append(src[idx][new])
        dst_parts.append(dst[idx][new])
        seen = np.union1d(seen, key[new])
        got = sum(len(p) for p in src_parts)
        if got >= num_edges:
            break
        want = num_edges - got
    src = np.concatenate(src_parts)[:num_edges]
    dst = np.concatenate(dst_parts)[:num_edges]
    order = np.lexsort((dst, src))
    return pd.DataFrame({"src": src[order], "dst": dst[order]})


def edge_weights(src: np.ndarray, dst: np.ndarray) -> np.ndarray:
    """Deterministic integer weights in {1..64} as float64.

    Integer weights keep every path sum exact in float64, so Spark and the
    NumPy oracle agree bit-for-bit on min/max aggregations. The wide range
    matters for fidelity: weighted shortest paths then use many more hops
    than the unweighted diameter, which is what makes synchronous
    Bellman-Ford execution produce the multiple intermediate updates per
    vertex that the paper measures (Table 2) and SLFE's "start late"
    removes. Narrow weights on a small-diameter RMAT leave no redundancy
    to reduce.
    """
    h = (src.astype(np.uint64) * np.uint64(2654435761)) ^ (
        dst.astype(np.uint64) * np.uint64(40503)
    )
    return (1 + (h % np.uint64(64))).astype(np.float64)


def make_edges(name: str, *, scale: float) -> pd.DataFrame:
    """Edge list (src, dst, w) for catalog graph ``name`` at ``scale``."""
    spec = GRAPHS[name]
    v, e = spec.sized(scale)
    pdf = rmat_edges(v, e, seed=spec.seed, abcd=_SKEW[spec.kind])
    pdf["w"] = edge_weights(pdf["src"].to_numpy(), pdf["dst"].to_numpy())
    return pdf
