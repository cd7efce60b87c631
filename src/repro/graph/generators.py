"""Synthetic directed-graph generators (numpy edge arrays).

The paper evaluates on 7 KONECT graphs (Slashdot ... Friendster). Offline, we
substitute degree-corrected stochastic block model (DCSBM) graphs: Zipf-ish
out/in-degree weights give power-law hubs, planted communities give the
block-wise structure the neighbor approximation relies on. Erdős–Rényi twins
(same n, m) serve the "random graph" ablation of Fig. 6.

All generators are deterministic in ``seed`` and return ``(n, src, dst)``
with ``src``/``dst`` int64 arrays. Unless ``allow_dangling`` is set they
guarantee every node has at least one out-edge, so the transition matrix is
column-stochastic and the paper's L1-norm lemmas hold exactly.
"""
from __future__ import annotations

import numpy as np

__all__ = [
    "dcsbm",
    "erdos_renyi",
    "cycle",
    "star",
    "complete",
    "chain",
    "ensure_min_out_degree",
]


def _dedupe(n: int, src: np.ndarray, dst: np.ndarray) -> tuple[np.ndarray, np.ndarray]:
    """Drop self-loops and duplicate edges; order is canonicalised."""
    keep = src != dst
    src, dst = src[keep], dst[keep]
    key = src.astype(np.int64) * n + dst
    key = np.unique(key)
    return key // n, key % n


def ensure_min_out_degree(
    n: int, src: np.ndarray, dst: np.ndarray, rng: np.random.Generator
) -> tuple[np.ndarray, np.ndarray]:
    """Add one out-edge (to a uniform non-self target) for each node with
    out-degree zero, so the row-normalised adjacency has no dangling rows."""
    deg = np.bincount(src, minlength=n)
    dangling = np.flatnonzero(deg == 0)
    if len(dangling) == 0:
        return src, dst
    tgt = rng.integers(0, n - 1, size=len(dangling))
    tgt = np.where(tgt >= dangling, tgt + 1, tgt)  # avoid self-loop
    return np.concatenate([src, dangling]), np.concatenate([dst, tgt])


def _zipf_weights(n: int, alpha: float, rng: np.random.Generator) -> np.ndarray:
    """Zipf(alpha) weights assigned to a random permutation of node ids,
    so hubs are spread across the id space (and across DCSBM blocks)."""
    ranks = np.arange(1, n + 1, dtype=np.float64)
    w = ranks ** (-alpha)
    rng.shuffle(w)
    return w / w.sum()


def dcsbm(
    n: int,
    m: int,
    *,
    n_blocks: int = 32,
    p_in: float = 0.8,
    alpha_out: float = 0.7,
    alpha_in: float = 0.9,
    seed: int = 0,
    allow_dangling: bool = False,
    max_rounds: int = 6,
) -> tuple[int, np.ndarray, np.ndarray, np.ndarray]:
    """Degree-corrected stochastic block model.

    Nodes are split into ``n_blocks`` contiguous communities. Each edge picks
    its source from a Zipf(alpha_out) categorical; with probability ``p_in``
    the destination is drawn (Zipf(alpha_in)-weighted) inside the source's
    block, otherwise globally. Duplicates/self-loops are removed and sampling
    repeats (up to ``max_rounds``) until ~``m`` unique edges exist.

    Returns ``(n, src, dst, block)`` where ``block[v]`` is the planted
    community label — used only by tests, never by the algorithms.
    """
    if n_blocks > n:
        n_blocks = max(1, n // 2)
    rng = np.random.default_rng(seed)
    block = (np.arange(n) * n_blocks) // n  # contiguous, near-equal blocks
    w_out = _zipf_weights(n, alpha_out, rng)
    w_in = _zipf_weights(n, alpha_in, rng)
    cum_in_global = np.cumsum(w_in)
    cum_in_global /= cum_in_global[-1]

    # Per-block cumulative in-weights for within-block destination sampling.
    starts = np.searchsorted(block, np.arange(n_blocks), side="left")
    ends = np.searchsorted(block, np.arange(n_blocks), side="right")
    block_cum = []
    for b in range(n_blocks):
        w = w_in[starts[b] : ends[b]]
        cw = np.cumsum(w)
        block_cum.append(cw / cw[-1])

    cum_out = np.cumsum(w_out)
    cum_out /= cum_out[-1]

    src_all = np.empty(0, dtype=np.int64)
    dst_all = np.empty(0, dtype=np.int64)
    need = m
    for _ in range(max_rounds):
        if need <= 0:
            break
        k = int(need * 1.15) + 16  # oversample for dedupe losses
        s = np.searchsorted(cum_out, rng.random(k)).astype(np.int64)
        inside = rng.random(k) < p_in
        d = np.empty(k, dtype=np.int64)
        # global destinations
        gi = ~inside
        d[gi] = np.searchsorted(cum_in_global, rng.random(gi.sum()))
        # within-block destinations, grouped per source block
        sb = block[s]
        for b in range(n_blocks):
            sel = inside & (sb == b)
            cnt = int(sel.sum())
            if cnt == 0:
                continue
            d[sel] = starts[b] + np.searchsorted(block_cum[b], rng.random(cnt))
        src_all = np.concatenate([src_all, s])
        dst_all = np.concatenate([dst_all, d])
        src_all, dst_all = _dedupe(n, src_all, dst_all)
        need = m - len(src_all)
    if not allow_dangling:
        src_all, dst_all = ensure_min_out_degree(n, src_all, dst_all, rng)
    return n, src_all, dst_all, block


def erdos_renyi(
    n: int,
    m: int,
    *,
    seed: int = 0,
    allow_dangling: bool = False,
    max_rounds: int = 6,
) -> tuple[int, np.ndarray, np.ndarray]:
    """Uniform random directed graph with ~m unique edges (the Fig. 6
    "random graph" twin: same n/m as a DCSBM graph, no structure)."""
    rng = np.random.default_rng(seed)
    src = np.empty(0, dtype=np.int64)
    dst = np.empty(0, dtype=np.int64)
    need = m
    for _ in range(max_rounds):
        if need <= 0:
            break
        k = int(need * 1.1) + 16
        s = rng.integers(0, n, size=k)
        d = rng.integers(0, n, size=k)
        src = np.concatenate([src, s])
        dst = np.concatenate([dst, d])
        src, dst = _dedupe(n, src, dst)
        need = m - len(src)
    if not allow_dangling:
        src, dst = ensure_min_out_degree(n, src, dst, rng)
    return n, src, dst


def cycle(n: int) -> tuple[int, np.ndarray, np.ndarray]:
    """Directed n-cycle: 0→1→…→n-1→0. Closed-form RWR/PageRank in tests."""
    src = np.arange(n, dtype=np.int64)
    return n, src, (src + 1) % n


def star(n: int) -> tuple[int, np.ndarray, np.ndarray]:
    """Bidirectional star: hub 0 ↔ leaves 1..n-1."""
    leaves = np.arange(1, n, dtype=np.int64)
    hub = np.zeros(n - 1, dtype=np.int64)
    return n, np.concatenate([hub, leaves]), np.concatenate([leaves, hub])


def complete(n: int) -> tuple[int, np.ndarray, np.ndarray]:
    """Complete directed graph without self-loops."""
    s, d = np.meshgrid(np.arange(n, dtype=np.int64), np.arange(n, dtype=np.int64))
    s, d = s.ravel(), d.ravel()
    keep = s != d
    return n, s[keep], d[keep]


def chain(n: int) -> tuple[int, np.ndarray, np.ndarray]:
    """Directed path 0→1→…→n-1. The last node has no out-edge, so this
    generator intentionally produces one dangling node (for dangling tests)."""
    src = np.arange(n - 1, dtype=np.int64)
    return n, src, src + 1
