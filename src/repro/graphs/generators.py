"""Synthetic graph generators — substitutes for the paper's SNAP datasets.

The paper evaluates on Facebook/DBLP/YouTube/Orkut/LiveJournal/Friendster.
Those graphs (up to 1.8B edges) are not available offline, so each is
replaced by a "-lite" Chung–Lu power-law graph matching that dataset's
**average-degree regime** (the property the paper's claims hinge on: it
enters the refined walk length ℓ of Eq. 6 and AMC's sample bound ψ via
1/d(s)+1/d(t), and drives the SMM frontier growth behind Eq. 17).
See DESIGN.md §3 for the substitution rationale.

All generators return an ``(n, edges)`` pair with ``edges`` of shape
(m, 2), are deterministic in ``seed``, and post-process to guarantee the
paper's standing assumptions: connected and non-bipartite (ergodic P).
"""
from __future__ import annotations

import numpy as np

from repro.graphs.csr import CSRGraph, csr_from_edges

Edges = np.ndarray


def _dedupe(n: int, u: np.ndarray, v: np.ndarray) -> Edges:
    """Canonicalize (min,max), drop self-loops and duplicates."""
    keep = u != v
    u, v = u[keep], v[keep]
    lo, hi = np.minimum(u, v), np.maximum(u, v)
    keys = np.unique(lo.astype(np.int64) * n + hi.astype(np.int64))
    return np.stack([keys // n, keys % n], axis=1)


def _connect_and_debipartite(
    n: int, edges: Edges, rng: np.random.Generator
) -> Edges:
    """Add the fewest edges needed to make the graph connected and
    non-bipartite (a triangle among the first three connectable nodes),
    preserving determinism."""
    parent = np.arange(n)

    def find(x: int) -> int:
        while parent[x] != x:
            parent[x] = parent[parent[x]]
            x = parent[x]
        return x

    def union(a: int, b: int) -> None:
        parent[find(a)] = find(b)

    for a, b in edges:
        union(int(a), int(b))
    extra = []
    roots = {}
    for x in range(n):
        r = find(x)
        if r in roots:
            continue
        roots[r] = x
    anchors = sorted(roots.values())
    base = anchors[0]
    for x in anchors[1:]:
        extra.append((base, x))
        union(base, x)
    edges = np.concatenate([edges, np.array(extra, dtype=np.int64).reshape(-1, 2)]) if extra else edges
    # Non-bipartite: ensure at least one odd cycle. Cheap sufficient fix:
    # add a triangle on three nodes (skipping edges already present).
    tri_nodes = [0, 1, 2] if n >= 3 else list(range(n))
    tri = [(a, b) for i, a in enumerate(tri_nodes) for b in tri_nodes[i + 1 :]]
    have = set(map(tuple, np.sort(edges, axis=1).tolist()))
    add = [e for e in tri if e not in have]
    if add:
        edges = np.concatenate([edges, np.array(add, dtype=np.int64)])
    return edges


def erdos_renyi(n: int, avg_degree: float, seed: int = 0) -> tuple[int, Edges]:
    """G(n, m)-style uniform random graph with ~n*avg_degree/2 edges."""
    rng = np.random.default_rng(seed)
    m = int(n * avg_degree / 2)
    u = rng.integers(0, n, 2 * m)
    v = rng.integers(0, n, 2 * m)
    edges = _dedupe(n, u, v)[:m]
    return n, _connect_and_debipartite(n, edges, rng)


def chung_lu(
    n: int, avg_degree: float, power: float = 2.5, seed: int = 0
) -> tuple[int, Edges]:
    """Chung–Lu power-law graph: expected degrees follow a Pareto-like
    distribution with exponent ``power``, scaled to ``avg_degree``.

    Sampling: draw both endpoints of each of ~n*avg_degree/2 edges
    proportionally to node weights — the standard O(m) Chung–Lu
    approximation, giving heavy-tailed degrees like social networks.
    """
    rng = np.random.default_rng(seed)
    w = (1.0 - rng.random(n)) ** (-1.0 / (power - 1.0))  # Pareto(power-1)
    w *= n * avg_degree / w.sum()
    p = w / w.sum()
    m_target = int(n * avg_degree / 2)
    # oversample to survive dedupe of the heavy head
    draw = int(m_target * 1.6) + 8
    u = rng.choice(n, size=draw, p=p)
    v = rng.choice(n, size=draw, p=p)
    edges = _dedupe(n, u, v)
    rng.shuffle(edges)
    edges = edges[:m_target]
    return n, _connect_and_debipartite(n, edges, rng)


def barabasi_albert(n: int, k: int, seed: int = 0) -> tuple[int, Edges]:
    """Barabási–Albert preferential attachment, each new node adds k edges."""
    rng = np.random.default_rng(seed)
    targets = list(range(k + 1))
    repeated: list[int] = []
    edges = []
    for a in range(k + 1):
        for b in range(a + 1, k + 1):
            edges.append((a, b))
            repeated += [a, b]
    for new in range(k + 1, n):
        chosen = set()
        while len(chosen) < k:
            chosen.add(repeated[int(rng.random() * len(repeated))])
        for c in chosen:
            edges.append((new, c))
            repeated += [new, c]
    del targets
    arr = np.array(edges, dtype=np.int64)
    return n, _connect_and_debipartite(n, _dedupe(n, arr[:, 0], arr[:, 1]), rng)


def ring(n: int) -> tuple[int, Edges]:
    """Cycle graph C_n (closed-form ER: r(s,t) = k(n-k)/n for hop distance k)."""
    edges = np.stack([np.arange(n), (np.arange(n) + 1) % n], axis=1)
    if n % 2 == 0:  # even cycle is bipartite; add one chord to break it
        edges = np.concatenate([edges, [[0, 2]]])
    return n, edges


def path(n: int) -> tuple[int, Edges]:
    """Path graph P_n plus a debipartizing triangle at the head.

    The pure path has closed-form ER r(s,t)=|s-t|; tests that need the
    exact series law use the returned edges minus the triangle chord.
    """
    edges = np.stack([np.arange(n - 1), np.arange(1, n)], axis=1)
    rng = np.random.default_rng(0)
    return n, _connect_and_debipartite(n, edges, rng)


def complete(n: int) -> tuple[int, Edges]:
    """Complete graph K_n (closed-form ER: r(s,t) = 2/n for s != t)."""
    idx = np.arange(n)
    u, v = np.meshgrid(idx, idx)
    mask = u < v
    return n, np.stack([u[mask], v[mask]], axis=1)


def barbell(k: int) -> tuple[int, Edges]:
    """Two K_k cliques joined by a single bridge — high-ER pair across."""
    _, e1 = complete(k)
    _, e2 = complete(k)
    edges = np.concatenate([e1, e2 + k, [[k - 1, k]]])
    return 2 * k, edges


def toy_example(seed: int = 7) -> tuple[int, Edges, int, int]:
    """Fig. 2's running-example stand-in: 11 nodes, d(s)=2, d(t)=7.

    The paper's figure shows a toy graph with nodes v1..v9 plus s and t
    where s has 2 neighbors and t has 7. The exact wiring is not fully
    recoverable from the figure, so we build a deterministic graph with
    the same (d(s), d(t)) = (2, 7) and a sparse s-side / dense t-side,
    tuned so #paths(s)+#paths(t) crosses AMC's η* around ℓ_f ≈ 6 — the
    crossover the figure's table illustrates (paper: ℓ_f ≥ 7).
    Returns (n, edges, s, t); s=9, t=10, helpers v0..v8.
    """
    s, t = 9, 10
    edges = [
        (s, 0), (s, 1),                      # d(s) = 2
        (t, 1), (t, 2), (t, 3), (t, 4), (t, 5), (t, 6), (t, 7),  # d(t) = 7
        (0, 1),                              # sparse s-side
        # dense t-side core (path counts explode with ℓ_f)
        (2, 3), (2, 4), (2, 5), (2, 6), (2, 7), (2, 8),
        (3, 4), (3, 5), (3, 6), (3, 7), (3, 8),
    ]
    return 11, np.array(sorted(set(edges)), dtype=np.int64), s, t


# --------------------------------------------------------------------------
# Dataset-lite substitutes (see DESIGN.md §3). n is scaled down ~3-4 orders
# of magnitude; avg degree matches Table 3 of the paper.
# --------------------------------------------------------------------------
DATASET_SPECS: dict[str, dict] = {
    "facebook_lite": dict(n=600, avg_degree=43.69, paper_n=4_039, paper_m=88_234),
    "dblp_lite": dict(n=2400, avg_degree=6.62, paper_n=317_080, paper_m=1_049_866),
    "youtube_lite": dict(n=3000, avg_degree=5.27, paper_n=1_134_890, paper_m=2_987_624),
    "orkut_lite": dict(n=1500, avg_degree=76.28, paper_n=3_072_441, paper_m=117_185_082),
    "livejournal_lite": dict(n=2000, avg_degree=17.35, paper_n=3_997_962, paper_m=34_681_189),
    "friendster_lite": dict(n=2500, avg_degree=55.06, paper_n=65_608_366, paper_m=1_806_067_135),
}


def dataset_lite(name: str, seed: int = 42) -> tuple[int, Edges]:
    """Generate the lite substitute for a paper dataset by name."""
    spec = DATASET_SPECS[name]
    return chung_lu(spec["n"], spec["avg_degree"], seed=seed)


def dataset_lite_csr(name: str, seed: int = 42) -> CSRGraph:
    """CSR form of :func:`dataset_lite` (cached per-process)."""
    key = (name, seed)
    if key not in _CSR_CACHE:
        n, edges = dataset_lite(name, seed)
        _CSR_CACHE[key] = csr_from_edges(n, edges)
    return _CSR_CACHE[key]


_CSR_CACHE: dict[tuple, CSRGraph] = {}
