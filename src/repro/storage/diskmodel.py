"""Analytical disk I/O model for the disk-based evaluation (§7.6).

The paper measures on a 5400-RPM HDD with ~80 MB/s sequential reads;
its disk-based conclusions rest entirely on *access patterns*: LES³
reads candidate groups as contiguous runs (groups are materialized
consecutively on disk), InvIdx performs a random probe per posting list
and per candidate set, DualTrans a random probe per R-tree node on the
search path and per candidate set, and brute force one sequential scan
of everything. This model charges exactly those patterns:

    time = n_seeks * seek_s + bytes_read / bandwidth

fed by each engine's actual per-query access counts (``SearchStats``).
Substitution rationale in DESIGN.md.
"""
from __future__ import annotations

from dataclasses import dataclass

from ..core.search import SearchStats


@dataclass
class DiskModel:
    bandwidth: float = 80e6  # bytes/s sequential (paper §7.1)
    seek_s: float = 0.010  # HDD seek + rotational latency
    token_bytes: int = 8

    def cost(self, n_seeks: int, n_bytes: float) -> float:
        return n_seeks * self.seek_s + n_bytes / self.bandwidth

    # -- engine-specific per-query costs -----------------------------------
    def les3(self, st: SearchStats, avg_set_bytes: float) -> float:
        """One seek per verified group, each group read sequentially."""
        return self.cost(st.n_groups_verified, st.n_candidates * avg_set_bytes)

    def invidx(self, st: SearchStats, avg_set_bytes: float) -> float:
        """A seek per probed posting list plus a random fetch per
        candidate set; posting entries are 8 bytes each."""
        return self.cost(
            st.n_probes + st.n_candidates,
            st.index_elems * self.token_bytes + st.n_candidates * avg_set_bytes,
        )

    def dualtrans(self, st: SearchStats, avg_set_bytes: float, d: int, fanout: int) -> float:
        """A seek per R-tree node inspected plus a random fetch per
        candidate set; a node is 2d coordinates of 8 bytes."""
        node_bytes = 2 * d * 8.0
        return self.cost(
            st.index_elems + st.n_candidates,
            st.index_elems * node_bytes + st.n_candidates * avg_set_bytes,
        )

    def brute(self, n_sets: int, avg_set_bytes: float) -> float:
        """One seek, then scan the database sequentially."""
        return self.cost(1, n_sets * avg_set_bytes)
