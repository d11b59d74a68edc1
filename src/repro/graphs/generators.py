"""Deterministic synthetic graph generators (paper §4.2, §8.1, Table 7).

The paper deliberately refuses to pin datasets and instead prescribes
*property regimes*: sparsity m/n, degree-distribution skew, triangle
count T and T-skew, and graph *origin* (clique-rich vs dense-but-
non-clique clusters, §8.6). Each generator below is a seeded numpy
edge-list builder targeting one regime; Table 7's columns are then
recomputed from the generated graphs (``jobs/table7_datasets.py``).

All generators return a canonical pandas edge list (``src < dst``,
deduped, no self-loops) so the same bytes feed Spark and the
networkx/DuckDB oracles.
"""
from __future__ import annotations

import numpy as np
import pandas as pd


def _canon(src: np.ndarray, dst: np.ndarray) -> pd.DataFrame:
    lo = np.minimum(src, dst)
    hi = np.maximum(src, dst)
    keep = lo != hi
    pdf = pd.DataFrame({"src": lo[keep], "dst": hi[keep]}).drop_duplicates()
    return pdf.sort_values(["src", "dst"]).reset_index(drop=True).astype("int64")


def _merge(*parts: pd.DataFrame) -> pd.DataFrame:
    pdf = pd.concat(parts, ignore_index=True).drop_duplicates()
    return pdf.sort_values(["src", "dst"]).reset_index(drop=True).astype("int64")


def erdos_renyi(n: int, p: float, seed: int = 0) -> pd.DataFrame:
    """G(n, m≈p·C(n,2)) — uniform random, low clustering (paper's ER model).

    Sampled as G(n, m) with binomial m: exact G(n,p) is O(n²); for the
    sparse regimes used here the two are statistically interchangeable.
    """
    g = np.random.default_rng(seed)
    m_target = g.binomial(n * (n - 1) // 2, p)
    # oversample to survive dedup/self-loop losses
    k = int(m_target * 1.2) + 16
    src = g.integers(0, n, k)
    dst = g.integers(0, n, k)
    pdf = _canon(src, dst)
    return pdf.head(m_target).reset_index(drop=True)


def gnm(n: int, m: int, seed: int = 0) -> pd.DataFrame:
    """G(n, m) with exactly ≈m uniform edges."""
    g = np.random.default_rng(seed)
    out = []
    need = m
    while need > 0:
        k = int(need * 1.3) + 16
        out.append(_canon(g.integers(0, n, k), g.integers(0, n, k)))
        pdf = _merge(*out)
        need = m - len(pdf)
    return pdf.head(m).reset_index(drop=True)


def rmat(scale: int, avg_degree: float, seed: int = 0,
         a: float = 0.57, b: float = 0.19, c: float = 0.19) -> pd.DataFrame:
    """Kronecker/R-MAT power-law graph (paper's Kronecker model, §8.7).

    n = 2^scale vertices, m ≈ avg_degree · n edges, recursive quadrant
    sampling with the Graph500 (a,b,c,d) parameters, fully vectorised.
    """
    g = np.random.default_rng(seed)
    n = 1 << scale
    m = int(avg_degree * n)
    k = int(m * 1.35) + 16
    src = np.zeros(k, dtype=np.int64)
    dst = np.zeros(k, dtype=np.int64)
    for bit in range(scale):
        r = g.random(k)
        # quadrant probabilities: a (0,0), b (0,1), c (1,0), d (1,1)
        src_bit = (r >= a + b).astype(np.int64)
        dst_bit = ((r >= a) & (r < a + b) | (r >= a + b + c)).astype(np.int64)
        src = (src << 1) | src_bit
        dst = (dst << 1) | dst_bit
    pdf = _canon(src, dst)
    return pdf.head(m).reset_index(drop=True)


def barabasi_albert(n: int, m_attach: int, seed: int = 0) -> pd.DataFrame:
    """Preferential attachment — heavy-tailed degrees, moderate triangles.

    Standard repeated-nodes implementation: each new vertex attaches to
    ``m_attach`` targets sampled ∝ degree.
    """
    g = np.random.default_rng(seed)
    targets = list(range(m_attach))
    repeated: list[int] = []
    src_l: list[int] = []
    dst_l: list[int] = []
    for v in range(m_attach, n):
        src_l.extend([v] * m_attach)
        dst_l.extend(targets)
        repeated.extend(targets)
        repeated.extend([v] * m_attach)
        # next targets: m_attach distinct nodes ∝ degree
        idx = g.integers(0, len(repeated), m_attach * 3)
        seen: list[int] = []
        for i in idx:
            t = repeated[i]
            if t not in seen:
                seen.append(t)
            if len(seen) == m_attach:
                break
        while len(seen) < m_attach:  # rare fallback
            t = int(g.integers(0, v))
            if t not in seen:
                seen.append(t)
        targets = seen
    return _canon(np.array(src_l, dtype=np.int64), np.array(dst_l, dtype=np.int64))


def planted_cliques(n_cliques: int, clique_size: int, background_n: int,
                    background_m: int, seed: int = 0) -> pd.DataFrame:
    """Many planted cliques over a sparse background (Flickr-photo analog).

    Clique members are sampled from the background vertex set, so cliques
    overlap the ambient graph — clique-rich origin per §8.6.
    """
    g = np.random.default_rng(seed)
    parts = [gnm(background_n, background_m, seed=seed + 1)]
    for i in range(n_cliques):
        members = g.choice(background_n, size=clique_size, replace=False)
        s, d = np.meshgrid(members, members)
        parts.append(_canon(s.ravel(), d.ravel()))
    return _merge(*parts)


def caveman(n_communities: int, community_size: int, p_in: float,
            n_bridges: int, seed: int = 0) -> pd.DataFrame:
    """Dense but mostly non-clique clusters (Livemocha analog, §8.6).

    Each community is an ER subgraph at density p_in < 1 (so large
    cliques are rare even though triangles abound) plus random bridges.
    """
    g = np.random.default_rng(seed)
    parts = []
    n = n_communities * community_size
    for ci in range(n_communities):
        base = ci * community_size
        sub = erdos_renyi(community_size, p_in, seed=seed + 7 * ci + 1)
        sub = sub + base
        parts.append(sub)
    bridges = _canon(g.integers(0, n, n_bridges * 2), g.integers(0, n, n_bridges * 2))
    parts.append(bridges.head(n_bridges))
    return _merge(*parts)


def grid_road(rows: int, cols: int, seed: int = 0) -> pd.DataFrame:
    """2-D grid — road-network analog: m/n ≈ 2, T ≈ 0, huge diameter."""
    r, c = np.meshgrid(np.arange(rows), np.arange(cols), indexing="ij")
    vid = (r * cols + c).ravel()
    right = vid.reshape(rows, cols)[:, :-1].ravel()
    down = vid.reshape(rows, cols)[:-1, :].ravel()
    src = np.concatenate([right, down])
    dst = np.concatenate([right + 1, down + cols])
    return _canon(src, dst)


def hub_clique(n: int, hub_size: int, periphery_m: int, seed: int = 0) -> pd.DataFrame:
    """One large clique + sparse periphery — extreme T-skew (Gupta3 analog)."""
    g = np.random.default_rng(seed)
    hub = np.arange(hub_size)
    s, d = np.meshgrid(hub, hub)
    parts = [_canon(s.ravel(), d.ravel())]
    parts.append(_canon(g.integers(0, n, periphery_m * 2),
                        g.integers(0, n, periphery_m * 2)).head(periphery_m))
    return _merge(*parts)


def labeled_erdos_renyi(n: int, p: float, n_labels: int, seed: int = 0
                        ) -> tuple[pd.DataFrame, pd.DataFrame]:
    """Labeled ER target graph for subgraph isomorphism (Fig. 7 dataset).

    Returns (edges, labels) with labels as (vertex, label) ints —
    the paper's VF3-Light evaluation uses labeled ER with n=10000, p=0.2;
    we scale n down and keep the labeled-ER family.
    """
    g = np.random.default_rng(seed)
    edges = erdos_renyi(n, p, seed=seed)
    labels = pd.DataFrame({"vertex": np.arange(n, dtype=np.int64),
                           "label": g.integers(0, n_labels, n).astype("int64")})
    return edges, labels


# Registry used by Table 7 / dataset-driven jobs: name -> (factory, regime note).
TABLE7_SUITE = {
    "orkut-like (BA social)": (
        lambda sf=1.0, seed=0: barabasi_albert(int(3000 * sf) + 10, 8, seed=seed),
        "heavy-tailed social network, moderate T",
    ),
    "flickr-like (planted cliques)": (
        lambda sf=1.0, seed=1: planted_cliques(
            int(60 * sf) + 2, 8, int(1500 * sf) + 20, int(4000 * sf) + 40, seed=seed),
        "clique-rich origin: huge T and many 4-cliques",
    ),
    "livemocha-like (caveman)": (
        lambda sf=1.0, seed=2: caveman(int(30 * sf) + 2, 50, 0.25,
                                       int(1500 * sf) + 10, seed=seed),
        "dense non-clique clusters: high T, few 4-cliques",
    ),
    "wiki-like (RMAT power law)": (
        lambda sf=1.0, seed=3: rmat(11, 6.0 * max(sf, 0.25), seed=seed),
        "power-law web graph, high degree skew",
    ),
    "gupta3-like (hub clique)": (
        lambda sf=1.0, seed=4: hub_clique(int(2000 * sf) + 60, 40,
                                          int(3000 * sf) + 30, seed=seed),
        "enormous T-skew: one hub clique dominates",
    ),
    "usa-roads-like (grid)": (
        lambda sf=1.0, seed=5: grid_road(int(55 * max(sf, 0.1)) + 4,
                                         int(55 * max(sf, 0.1)) + 4),
        "extremely low m/n and T, huge diameter",
    ),
    "er-uniform": (
        lambda sf=1.0, seed=6: erdos_renyi(int(2500 * sf) + 20, 0.004, seed=seed),
        "uniform degrees, low clustering control",
    ),
    "jester-like (dense ER)": (
        lambda sf=1.0, seed=7: erdos_renyi(int(600 * sf) + 20, 0.08, seed=seed),
        "high m/n, many triangles via density alone",
    ),
}
