"""Deterministic synthetic data-graph generators.

The paper evaluates on 7 real graphs (Table 3: GO, LJ, OR, UK, EU, FS,
CW). Those are unavailable offline, so each gets a scaled-down synthetic
*twin* that preserves the properties subgraph-enumeration cost depends
on: average degree, degree skew (heavy-tailed for social/web graphs,
near-regular for the road graph), and connectivity. See DESIGN.md
(substitution table).

All generators return a pandas DataFrame of canonical undirected edges
``(a, b)`` with ``a < b``, deduplicated, no self loops, deterministic in
``seed``.
"""
from __future__ import annotations

from dataclasses import dataclass

import numpy as np
import pandas as pd


def _dedupe(a: np.ndarray, b: np.ndarray) -> pd.DataFrame:
    lo, hi = np.minimum(a, b), np.maximum(a, b)
    keep = lo != hi
    pdf = pd.DataFrame({"a": lo[keep], "b": hi[keep]})
    return (
        pdf.drop_duplicates().sort_values(["a", "b"]).reset_index(drop=True)
    )


def chung_lu(
    n: int,
    target_edges: int,
    *,
    gamma: float = 2.5,
    d_max_frac: float = 0.05,
    seed: int = 0,
) -> pd.DataFrame:
    """Power-law (Chung–Lu style) graph: endpoint of each edge sampled with
    probability proportional to a power-law weight ``w_v ~ v^(-1/(gamma-1))``.

    ``gamma`` is the target degree-distribution exponent (smaller = more
    skew); ``d_max_frac`` caps the largest expected degree at that
    fraction of ``n`` so mini-scale hubs do not make enumeration
    intractable. Oversamples then dedupes, so the realised edge count is
    slightly below ``target_edges``.
    """
    rng = np.random.default_rng(seed)
    ranks = np.arange(1, n + 1, dtype=np.float64)
    w = ranks ** (-1.0 / (gamma - 1.0))
    # Cap expected max degree: E[deg(v)] ~ 2m * w_v / sum(w).
    cap = d_max_frac * n * w.sum() / (2.0 * target_edges)
    w = np.minimum(w, cap)
    p = w / w.sum()
    m = int(target_edges * 1.25)  # oversample to compensate dedup losses
    a = rng.choice(n, size=m, p=p)
    b = rng.choice(n, size=m, p=p)
    pdf = _dedupe(a, b)
    if len(pdf) > target_edges:
        pdf = pdf.iloc[:target_edges].reset_index(drop=True)
    return _ensure_connected_ids(pdf, n, rng)


def erdos_renyi(n: int, target_edges: int, *, seed: int = 0) -> pd.DataFrame:
    """Uniform random graph (used as a near-regular control)."""
    rng = np.random.default_rng(seed)
    m = int(target_edges * 1.15)
    a = rng.integers(0, n, m)
    b = rng.integers(0, n, m)
    pdf = _dedupe(a, b).iloc[:target_edges].reset_index(drop=True)
    return _ensure_connected_ids(pdf, n, rng)


def road_grid(side: int, *, extra_frac: float = 0.05, seed: int = 0) -> pd.DataFrame:
    """Road-network twin (for EU): a ``side x side`` grid (degree ≈ 4,
    huge diameter) plus a few random shortcut edges."""
    rng = np.random.default_rng(seed)
    n = side * side
    ids = np.arange(n).reshape(side, side)
    right = np.stack([ids[:, :-1].ravel(), ids[:, 1:].ravel()], axis=1)
    down = np.stack([ids[:-1, :].ravel(), ids[1:, :].ravel()], axis=1)
    base = np.concatenate([right, down])
    n_extra = int(len(base) * extra_frac)
    extra = rng.integers(0, n, size=(n_extra, 2))
    allp = np.concatenate([base, extra])
    return _dedupe(allp[:, 0], allp[:, 1])


def hub_web(
    n: int,
    target_edges: int,
    *,
    n_hubs: int = 5,
    hub_frac: float = 0.15,
    seed: int = 0,
) -> pd.DataFrame:
    """Web-graph twin (for UK/CW): power-law body plus a few extreme hubs
    (the paper's CW has d_max = 7.7% of |V|)."""
    rng = np.random.default_rng(seed)
    body = chung_lu(n, int(target_edges * (1 - hub_frac)), gamma=2.2, seed=seed)
    hub_edges = int(target_edges * hub_frac)
    hubs = rng.integers(0, max(1, n // 100), size=hub_edges)  # hubs = low ids
    others = rng.integers(0, n, size=hub_edges)
    hub_pdf = _dedupe(hubs, others)
    return (
        pd.concat([body, hub_pdf])
        .drop_duplicates()
        .sort_values(["a", "b"])
        .reset_index(drop=True)
    )


def _ensure_connected_ids(pdf: pd.DataFrame, n: int, rng: np.random.Generator) -> pd.DataFrame:
    """Attach isolated vertex ids to random existing ones so every id in
    ``0..n-1`` appears (keeps |V| deterministic for Table 3 stats)."""
    present = pd.unique(pdf[["a", "b"]].values.ravel())
    missing = np.setdiff1d(np.arange(n), present)
    if len(missing) == 0:
        return pdf
    partners = rng.choice(present, size=len(missing))
    extra = _dedupe(missing, partners)
    return (
        pd.concat([pdf, extra])
        .drop_duplicates()
        .sort_values(["a", "b"])
        .reset_index(drop=True)
    )


# ---------------------------------------------------------------------------
# Named dataset registry: scaled twins of the paper's Table 3 graphs.
# ---------------------------------------------------------------------------


@dataclass(frozen=True)
class DatasetSpec:
    """Recipe for one synthetic twin; ``paper`` holds the original graph's
    Table 3 row for EXPERIMENTS.md side-by-sides."""

    name: str
    kind: str  # chung_lu | road | web
    n: int
    avg_deg: float
    gamma: float
    paper: tuple[int, int, int, float]  # |V|, |E|, d_max, d_avg
    d_max_frac: float = 0.05  # hub cap as a fraction of |V|

    def generate(self, *, scale: float = 1.0, seed: int = 7) -> pd.DataFrame:
        n = max(64, int(self.n * scale))
        m = int(n * self.avg_deg / 2)
        if self.kind == "road":
            side = max(8, int(np.sqrt(n)))
            return road_grid(side, seed=seed)
        if self.kind == "web":
            return hub_web(n, m, seed=seed)
        return chung_lu(
            n, m, gamma=self.gamma, d_max_frac=self.d_max_frac, seed=seed
        )


DATASETS: dict[str, DatasetSpec] = {
    # GO's hub cap mirrors the real graph's d_max/|V| ~ 0.7%: path-query
    # operand sizes (Table 6) are extremely hub-sensitive at mini-scale.
    "GO": DatasetSpec("GO", "chung_lu", 4000, 5.0, 2.4, (875_713, 4_322_051, 6_332, 5.0), d_max_frac=0.012),
    "LJ": DatasetSpec("LJ", "chung_lu", 4000, 14.0, 2.6, (4_847_571, 43_369_619, 20_333, 17.9)),
    "OR": DatasetSpec("OR", "chung_lu", 3000, 24.0, 2.8, (3_072_441, 117_185_083, 33_313, 38.1)),
    "UK": DatasetSpec("UK", "web", 6000, 10.0, 2.2, (18_520_486, 298_113_762, 194_955, 16.1)),
    "EU": DatasetSpec("EU", "road", 8100, 3.9, 0.0, (173_789_185, 347_997_111, 20, 3.9)),
    "FS": DatasetSpec("FS", "chung_lu", 8000, 16.0, 2.7, (65_608_366, 1_806_067_135, 5_214, 27.5)),
    "CW": DatasetSpec("CW", "web", 12000, 18.0, 2.2, (978_409_098, 42_574_107_469, 75_611_696, 43.5)),
}


def dataset(name: str, *, scale: float = 1.0, seed: int = 7) -> pd.DataFrame:
    """Generate the named twin at ``scale`` (1.0 = benchmark scale)."""
    return DATASETS[name].generate(scale=scale, seed=seed)
