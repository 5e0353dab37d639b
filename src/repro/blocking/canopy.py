"""Canopy blocking [50] (§5.1).

Two thresholds ``b_s ≥ m_s`` over a *cheap* similarity (token Jaccard
restricted to each record's first few tokens — the single-attribute
inverted-index spirit of the paper) build overlapping canopies; inside
each canopy a *refined* metric (full token Jaccard) links pairs, and
matching pairs merge blocks transitively until convergence.

The cheap metric looks at less evidence than LSH's embeddings, which
is why canopy lands between "no blocking" and LSH in Appendix A.3's
Table 14.
"""
from __future__ import annotations

from ..core.records import Record
from ..embed.similarity import jaccard
from .lsh import blocks_from_edges, split_oversized


def cheap_tokens(r: Record, k: int = 4) -> frozenset[str]:
    """First-attribute-ish token subset for the inexpensive metric."""
    return frozenset(sorted(r.tokens)[:k])


def canopy_blocks(
    records: list[Record],
    *,
    b_s: float = 0.5,
    m_s: float = 0.3,
    refine_threshold: float = 0.4,
    max_block_size: int = 200,
    seed: int = 0,
) -> list[list[Record]]:
    """McCallum-style canopies + refined transitive merging."""
    if b_s < m_s:
        raise ValueError("need b_s >= m_s")
    if not records:
        return []
    cheap = {r.rid: cheap_tokens(r) for r in records}
    unassigned = list(range(len(records)))
    canopies: list[list[int]] = []
    edges: list[tuple[int, int]] = []
    while unassigned:
        center = unassigned[0]
        canopy = [center]
        removed = {center}
        for i in unassigned[1:]:
            s = jaccard(cheap[records[center].rid], cheap[records[i].rid])
            if s > m_s:
                canopy.append(i)
            if s > b_s:  # tight threshold: same block, removed from pool
                removed.add(i)
                edges.append((center, i))
        canopies.append(canopy)
        unassigned = [i for i in unassigned if i not in removed]
    # refined metric inside each canopy links blocks transitively
    for canopy in canopies:
        for a in range(len(canopy)):
            for b in range(a + 1, len(canopy)):
                i, k = canopy[a], canopy[b]
                if jaccard(records[i].tokens, records[k].tokens) >= refine_threshold:
                    edges.append((i, k))
    blocks: list[list[Record]] = []
    for blk in blocks_from_edges(records, edges):
        blocks.extend(split_oversized(blk, max_block_size, seed))
    return blocks
