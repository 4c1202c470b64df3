"""Synthetic power-law graph corpus — analogs of the paper's Table 3 graphs.

The paper evaluates on seven real-world graphs (social networks, web
graphs, one biological graph) of up to 64 B edges. Those are not
available offline and would not fit this machine, so we generate
*structural analogs* at laptop scale (see DESIGN.md §3, substitution 1):

* social analogs (OK/TW/LJ/FR)  — RMAT with skewed quadrant
  probabilities: power-law degrees, weak locality, hard to partition
  (replication factor well above 1 even for NE).
* web analogs (IT/WI/UK)        — host-locality model: Zipf-sized host
  blocks with mostly intra-host edges plus a sparse power-law inter-host
  hub graph: excellent partitionability (RF near 1), mirroring the
  paper's observation that web graphs partition well.
* biological analog (BR)        — few vertices, very high mean degree,
  dense overlapping communities.

All generators are deterministic in ``seed`` and return an
:class:`EdgeList` (numpy ``(m, 2)`` uint32 array of directed input
edges, deduplicated as *undirected* pairs, self-loops removed, vertex
ids compact ``0..n-1``). Direction of each edge is the generated
direction — the pruned CSR's out/in split (paper §3.2.2) depends on it.
"""
from __future__ import annotations

from dataclasses import dataclass

import numpy as np
import pandas as pd


@dataclass(frozen=True)
class EdgeList:
    """An undirected graph stored as a directed edge array.

    ``edges[i] = (u, v)`` is the i-th input edge as it would appear in
    the paper's binary edge-list file; the graph itself is undirected,
    and each unordered pair occurs exactly once.
    """

    edges: np.ndarray  # (m, 2) uint32
    n: int  # number of vertices (compact ids 0..n-1)

    @property
    def m(self) -> int:
        """Number of undirected edges."""
        return int(self.edges.shape[0])

    @property
    def size_bytes(self) -> int:
        """Size of the binary edge list with 32-bit vertex ids (Table 3)."""
        return self.m * 8

    def degrees(self) -> np.ndarray:
        """Per-vertex undirected degree, shape (n,)."""
        return (
            np.bincount(self.edges[:, 0], minlength=self.n)
            + np.bincount(self.edges[:, 1], minlength=self.n)
        )


def _dedup_compact(src: np.ndarray, dst: np.ndarray) -> EdgeList:
    """Drop self-loops, dedup unordered pairs (keep first direction), relabel."""
    keep = src != dst
    src, dst = src[keep], dst[keep]
    lo = np.minimum(src, dst).astype(np.uint64)
    hi = np.maximum(src, dst).astype(np.uint64)
    key = (lo << np.uint64(32)) | hi
    # keep the first occurrence of each unordered pair, preserving input order
    order = np.argsort(key, kind="stable")
    sorted_key = key[order]
    first_of_group = np.ones(len(key), dtype=bool)
    first_of_group[1:] = sorted_key[1:] != sorted_key[:-1]
    keep_idx = np.sort(order[first_of_group])
    src, dst = src[keep_idx], dst[keep_idx]
    # compact relabel
    verts, inverse = np.unique(np.concatenate([src, dst]), return_inverse=True)
    m = len(src)
    edges = np.empty((m, 2), dtype=np.uint32)
    edges[:, 0] = inverse[:m]
    edges[:, 1] = inverse[m:]
    return EdgeList(edges=edges, n=int(len(verts)))


def rmat(
    *,
    scale: int,
    n_edges: int,
    a: float = 0.57,
    b: float = 0.19,
    c: float = 0.19,
    seed: int = 0,
) -> EdgeList:
    """RMAT power-law graph (Graph500-style quadrant recursion).

    ``scale`` is log2 of the vertex-id space; ``n_edges`` edges are
    sampled (fewer survive dedup). Default (a,b,c,d)=(.57,.19,.19,.05)
    gives the skew typical of social networks.
    """
    g = np.random.default_rng(seed)
    d = 1.0 - a - b - c
    src = np.zeros(n_edges, dtype=np.uint64)
    dst = np.zeros(n_edges, dtype=np.uint64)
    probs = np.array([a, b, c, d])
    cum = np.cumsum(probs)
    for _bit in range(scale):
        r = g.random(n_edges)
        quad = np.searchsorted(cum, r)
        src = (src << np.uint64(1)) | (quad >= 2).astype(np.uint64)
        dst = (dst << np.uint64(1)) | (quad % 2).astype(np.uint64)
    # permute ids so the RMAT hub structure is not aligned with id order
    perm = g.permutation(1 << scale).astype(np.uint64)
    return _dedup_compact(perm[src], perm[dst])


def web_locality(
    *,
    n_hosts: int,
    mean_host_size: float,
    n_edges: int,
    p_intra: float = 0.9,
    host_alpha: float = 1.3,
    seed: int = 0,
) -> EdgeList:
    """Web-graph analog: Zipf-sized hosts, mostly intra-host edges.

    Intra-host edges use preferential attachment within the host block
    (each host has a local hub: its index page). Inter-host edges run
    between host hubs with power-law host popularity. A good partitioner
    can cut almost only on the hub vertices, so the replication factor
    approaches 1 — the paper's web-graph regime.
    """
    g = np.random.default_rng(seed)
    ranks = np.arange(1, n_hosts + 1, dtype=np.float64)
    w = ranks ** (-host_alpha)
    w /= w.sum()
    sizes = np.maximum(1, g.poisson(w * mean_host_size * n_hosts)).astype(np.int64)
    offsets = np.concatenate([[0], np.cumsum(sizes)])
    n = int(offsets[-1])

    n_intra = int(n_edges * p_intra)
    n_inter = n_edges - n_intra
    # intra-host: pick a host ∝ size, then an edge between a random page
    # and a page biased toward low local index (local hubs).
    host_w = sizes / sizes.sum()
    h = g.choice(n_hosts, size=n_intra, p=host_w)
    hs = sizes[h].astype(np.float64)
    u_local = np.floor(g.random(n_intra) ** 2.0 * hs).astype(np.int64)  # hub-biased
    v_local = np.floor(g.random(n_intra) * hs).astype(np.int64)
    src_i = offsets[h] + u_local
    dst_i = offsets[h] + v_local
    # inter-host: hub (local index 0) to hub, hosts ∝ popularity
    h1 = g.choice(n_hosts, size=n_inter, p=w)
    h2 = g.choice(n_hosts, size=n_inter, p=w)
    src_x = offsets[h1]
    dst_x = offsets[h2]
    src = np.concatenate([src_i, src_x]).astype(np.uint64)
    dst = np.concatenate([dst_i, dst_x]).astype(np.uint64)
    return _dedup_compact(src, dst)


def dense_communities(
    *,
    n: int,
    n_comms: int,
    n_edges: int,
    p_intra: float = 0.95,
    seed: int = 0,
) -> EdgeList:
    """Brain-graph analog: few vertices, very high mean degree, dense
    overlapping communities (each vertex belongs to a primary community;
    most edges are intra-community)."""
    g = np.random.default_rng(seed)
    comm = g.integers(0, n_comms, n)
    order = np.argsort(comm, kind="stable")
    # positions grouped by community
    pos_of = np.empty(n, dtype=np.int64)
    pos_of[order] = np.arange(n)
    starts = np.searchsorted(comm[order], np.arange(n_comms))
    counts = np.bincount(comm, minlength=n_comms)
    n_in = int(n_edges * p_intra)
    c = g.integers(0, n_comms, n_in)
    cs = np.maximum(counts[c], 1)
    u = starts[c] + np.floor(g.random(n_in) * cs).astype(np.int64)
    v = starts[c] + np.floor(g.random(n_in) * cs).astype(np.int64)
    n_out = n_edges - n_in
    u2 = g.integers(0, n, n_out)
    v2 = g.integers(0, n, n_out)
    src = np.concatenate([order[u], u2]).astype(np.uint64)
    dst = np.concatenate([order[v], v2]).astype(np.uint64)
    return _dedup_compact(src, dst)


# --- Named analog corpus (Table 3) -------------------------------------
# ``scale`` multiplies the target edge count; 1.0 is bench scale,
# tests use ~0.02-0.1. Entries mirror Table 3's ordering & types.

_SPECS = {
    # name: (kind, params at scale=1.0, type label)
    "LJ": ("rmat", dict(scale=15, n_edges=220_000, a=0.57, seed=11), "Social"),
    "OK": ("rmat", dict(scale=15, n_edges=400_000, a=0.57, seed=12), "Social"),
    "BR": (
        "dense",
        dict(n=4_000, n_comms=40, n_edges=450_000, seed=13),
        "Biological",
    ),
    "WI": (
        "web",
        dict(n_hosts=2_500, mean_host_size=18.0, n_edges=420_000, p_intra=0.85, seed=14),
        "Web",
    ),
    "IT": (
        "web",
        dict(n_hosts=4_000, mean_host_size=16.0, n_edges=550_000, p_intra=0.92, seed=15),
        "Web",
    ),
    "TW": ("rmat", dict(scale=16, n_edges=500_000, a=0.65, b=0.15, c=0.15, seed=16), "Social"),
    "FR": ("rmat", dict(scale=17, n_edges=600_000, a=0.55, seed=17), "Social"),
    "UK": (
        "web",
        dict(n_hosts=6_000, mean_host_size=17.0, n_edges=700_000, p_intra=0.93, seed=18),
        "Web",
    ),
}

GRAPH_NAMES = tuple(_SPECS)


def graph_type(name: str) -> str:
    """Table 3 'Type' column for an analog graph."""
    return _SPECS[name][2]


def graph(name: str, *, scale: float = 1.0) -> EdgeList:
    """Generate the named analog graph at ``scale`` × its bench-size."""
    kind, params, _ = _SPECS[name]
    p = dict(params)
    p["n_edges"] = max(16, int(p["n_edges"] * scale))
    if kind == "rmat":
        # shrink the id space with the edge count to keep density
        if scale < 1.0:
            p["scale"] = max(8, p["scale"] + int(np.floor(np.log2(max(scale, 1e-6)))))
        return rmat(**p)
    if kind == "web":
        if scale < 1.0:
            p["n_hosts"] = max(16, int(p["n_hosts"] * scale))
        return web_locality(**p)
    if kind == "dense":
        if scale < 1.0:
            p["n"] = max(64, int(p["n"] * scale))
            p["n_comms"] = max(4, int(p["n_comms"] * scale))
        return dense_communities(**p)
    raise ValueError(f"unknown graph kind {kind!r}")


def to_pandas(el: EdgeList) -> pd.DataFrame:
    """Edge list as a pandas frame with int64 ``src``/``dst`` columns."""
    return pd.DataFrame(
        {"src": el.edges[:, 0].astype("int64"), "dst": el.edges[:, 1].astype("int64")}
    )


def to_spark(spark, el: EdgeList):
    """Edge list as a Spark DataFrame (src: long, dst: long)."""
    return spark.createDataFrame(to_pandas(el))
