"""The byte-accounting memory model (§5.1.1, Appendix C, DESIGN.md §2).

The paper's scalability arguments are stated in terms of difference counts
times per-entry sizes: a difference is a VT pair (d bytes) plus a state
(s bytes); Det-Drop keeps d bytes per dropped difference (hence the
d/(d+s) scalability ceiling); Prob-Drop's Bloom filter is a fixed-size bit
array; Appendix C packs a VT pair into 8 bytes plus the vertex-id key.

We fix d = 12 (8-byte vertex id + 4-byte iteration) and s = 8 (float64
state), giving 20 B per stored D difference, 24 B per stored δJ entry
(VT + state + 4-byte source id — what VDC stores and JOD drops), and 12 B
per Det-Drop DroppedVT entry. OOM in our experiments means this modelled
total exceeds the configured budget, which mirrors the paper's fixed
10 GB difference-storage budget at our ~1/1000 graph scale.
"""
from __future__ import annotations

BYTES_VT = 12
BYTES_STATE = 8
BYTES_DIFF = BYTES_VT + BYTES_STATE  # 20 B per stored D difference
BYTES_DJ = BYTES_DIFF + 4  # 24 B per stored δJ (join output) difference
BYTES_DROPPED_DET = BYTES_VT  # 12 B per Det-Drop DroppedVT entry


def diff_bytes(n_d_diffs: int, n_j_diffs: int = 0) -> int:
    """Bytes to store difference sets: D always, δJ only for vanilla DC."""
    return n_d_diffs * BYTES_DIFF + n_j_diffs * BYTES_DJ


def det_drop_ceiling() -> float:
    """Max fraction of difference memory Det-Drop can ever save: s/(d+s).

    §5.1.1: dropping 100% of differences still keeps d bytes of every
    d+s-byte difference, a hard d/(d+s) residue — i.e. savings are capped
    at s/(d+s) (40% with our constants).
    """
    return BYTES_STATE / BYTES_DIFF


def max_queries_under_budget(
    per_query_bytes: float, budget_bytes: float, fixed_bytes: float = 0.0
) -> int:
    """How many concurrent queries fit a difference-memory budget."""
    if per_query_bytes <= 0:
        return 10**9
    return int((budget_bytes - fixed_bytes) // per_query_bytes)
