"""Locality-Sensitive-Hashing blocking (§5.1, the paper's default).

Random-hyperplane LSH over the hashing embeddings: each record gets
``n_bands`` signatures of ``band_bits`` sign bits; records sharing any
band bucket are linked, and connected components become blocks (the
OR-over-bands construction gives high recall for similar pairs). The
stochastic hash can co-locate dissimilar records, so blocks are
*purified*: a member whose best cosine similarity to the rest of its
block is below ``threshold`` is evicted to a singleton block —
mirroring the paper's "retain only pairs with similarity exceeding a
threshold b_t".

Oversized blocks (pathological near-duplicate vocabularies) are split
by k-means so downstream per-block work stays bounded.
"""
from __future__ import annotations

import numpy as np

from ..core.nrs import kmeans
from ..core.records import Record
from ..embed.similarity import cosine_matrix


def band_signatures(
    vecs: np.ndarray, n_bands: int = 6, band_bits: int = 5, seed: int = 0
) -> np.ndarray:
    """(n, n_bands) integer band signatures from sign-of-projection bits."""
    g = np.random.default_rng(seed)
    n, dim = vecs.shape
    out = np.zeros((n, n_bands), dtype=np.int64)
    for b in range(n_bands):
        planes = g.normal(size=(band_bits, dim))
        bits = (vecs @ planes.T) > 0  # (n, band_bits)
        out[:, b] = bits @ (1 << np.arange(band_bits))
    return out


class _UF:
    def __init__(self, n: int):
        self.p = list(range(n))

    def find(self, x: int) -> int:
        while self.p[x] != x:
            self.p[x] = self.p[self.p[x]]
            x = self.p[x]
        return x

    def union(self, a: int, b: int) -> None:
        ra, rb = self.find(a), self.find(b)
        if ra != rb:
            self.p[max(ra, rb)] = min(ra, rb)


def blocks_from_edges(
    records: list[Record], edges: "list[tuple[int, int]]"
) -> list[list[Record]]:
    """Connected components over positional edges → blocks."""
    uf = _UF(len(records))
    for a, b in edges:
        uf.union(a, b)
    comps: dict[int, list[Record]] = {}
    for i, r in enumerate(records):
        comps.setdefault(uf.find(i), []).append(r)
    return sorted(comps.values(), key=lambda b: min(r.rid for r in b))


def purify_block(
    block: list[Record], threshold: float
) -> list[list[Record]]:
    """Evict members with no sufficiently similar peer (threshold b_t)."""
    if len(block) <= 1:
        return [block]
    sims = cosine_matrix(np.stack([r.vec for r in block]))
    np.fill_diagonal(sims, -1.0)
    keep_mask = sims.max(axis=1) >= threshold
    kept = [r for r, k in zip(block, keep_mask) if k]
    evicted = [[r] for r, k in zip(block, keep_mask) if not k]
    return ([kept] if kept else []) + evicted


def split_oversized(
    block: list[Record], max_size: int, seed: int = 0
) -> list[list[Record]]:
    """k-means split of a block larger than ``max_size``."""
    if len(block) <= max_size:
        return [block]
    k = int(np.ceil(len(block) / (max_size // 2)))
    labels, _ = kmeans(np.stack([r.vec for r in block]), k, seed=seed)
    parts: dict[int, list[Record]] = {}
    for r, lab in zip(block, labels):
        parts.setdefault(int(lab), []).append(r)
    out: list[list[Record]] = []
    for p in parts.values():  # recurse in case a split part is still big
        if len(p) < len(block):
            out.extend(split_oversized(p, max_size, seed + 1))
        else:  # k-means failed to split (identical vectors): hard chop
            out.extend(
                [p[i : i + max_size] for i in range(0, len(p), max_size)]
            )
    return out


def lsh_blocks(
    records: list[Record],
    *,
    n_bands: int = 6,
    band_bits: int = 5,
    threshold: float = 0.35,
    max_block_size: int = 200,
    seed: int = 0,
) -> list[list[Record]]:
    """Full LSH blocking: band buckets → components → purify → split."""
    if not records:
        return []
    vecs = np.stack([r.vec for r in records])
    sigs = band_signatures(vecs, n_bands, band_bits, seed)
    edges: list[tuple[int, int]] = []
    for b in range(n_bands):
        buckets: dict[int, list[int]] = {}
        for i in range(len(records)):
            buckets.setdefault(int(sigs[i, b]), []).append(i)
        for members in buckets.values():
            if len(members) < 2:
                continue
            # verify candidate pairs against b_t before linking — the
            # stochastic hash co-locates dissimilar records, and
            # unverified links percolate buckets into giant components
            sub = cosine_matrix(vecs[members])
            ii, kk = np.where(np.triu(sub, 1) >= threshold)
            edges.extend(
                (members[int(a)], members[int(c)]) for a, c in zip(ii, kk)
            )
    blocks: list[list[Record]] = []
    for blk in blocks_from_edges(records, edges):
        for part in split_oversized(blk, max_block_size, seed):
            blocks.extend(purify_block(part, threshold))
    return blocks


def single_block(
    records: list[Record], chunk: int = 250
) -> list[list[Record]]:
    """The "w/o blocking" baseline of Appendix A.3.

    No similarity information is used: records are processed in their
    arbitrary input order. Chunks of ``chunk`` records bound the
    per-unit work (NRS's k-means over tens of thousands of records at
    once would be intractable); because the chunking is
    similarity-blind, duplicates scatter across chunks — exactly the
    quality/cost penalty Table 14 attributes to skipping blocking.
    """
    return [
        records[i : i + chunk] for i in range(0, len(records), chunk)
    ]
