"""RID index: in-memory CSR over a table's materialized RID column (paper §5).

For a table *F* with a predefined join to *P* (so *F* carries a materialized
``RID(P)`` column), the RID index maps each RID of *P* to the list of RIDs of
the *F* rows pointing at it — the relational analogue of a GDBMS adjacency
list index, stored as compressed sparse row (CSR) NumPy arrays.

The *extended* RID index (paper §5.2) additionally stores, aligned with each
F-RID, the materialized RID of a second entity table *P2* — the analogue of
storing both edge IDs and neighbour node IDs in an adjacency list. It enables
(a) reverse semijoins ``F ⋉ P`` via SIP (SJoinIdxR) and (b) the join-merging
optimization that skips the scan of *F* entirely (SJoinIdxM).
"""
from __future__ import annotations

from dataclasses import dataclass

import numpy as np
import pandas as pd


@dataclass
class RIDIndex:
    """CSR index keyed by P-RID.

    ``offsets`` has ``n_p + 1`` entries; the F-RIDs joining P-row ``i`` are
    ``f_rids[offsets[i]:offsets[i+1]]``. ``ext_rids`` (if present) holds the
    P2-RIDs aligned one-to-one with ``f_rids``.
    """

    offsets: np.ndarray  # int64, shape (n_p + 1,)
    f_rids: np.ndarray  # int64
    ext_rids: np.ndarray | None  # int64 aligned with f_rids, or None

    @classmethod
    def build(
        cls,
        rid_p_values: pd.Series | np.ndarray,
        n_p: int,
        ext_values: pd.Series | np.ndarray | None = None,
    ) -> "RIDIndex":
        """Build from F's materialized RID column (position = F's own RID).

        Null RIDs (dangling foreign keys) are excluded — they join nothing.
        """
        rid_p = pd.Series(rid_p_values)
        valid = rid_p.notna().to_numpy()
        keys = rid_p.to_numpy(dtype="float64", na_value=np.nan)[valid].astype(np.int64)
        own = np.flatnonzero(valid).astype(np.int64)
        order = np.argsort(keys, kind="stable")
        keys_sorted = keys[order]
        counts = np.bincount(keys_sorted, minlength=n_p)
        offsets = np.concatenate(([0], np.cumsum(counts))).astype(np.int64)
        f_sorted = own[order]
        ext_sorted = None
        if ext_values is not None:
            ext = pd.Series(ext_values)
            ext_np = ext.to_numpy(dtype="float64", na_value=np.nan)[valid]
            if np.isnan(ext_np).any():
                raise ValueError("extended RID column contains nulls for indexed rows")
            ext_sorted = ext_np.astype(np.int64)[order]
        return cls(offsets=offsets, f_rids=f_sorted, ext_rids=ext_sorted)

    @property
    def n_keys(self) -> int:
        return int(self.offsets.shape[0] - 1)

    @property
    def n_entries(self) -> int:
        return int(self.f_rids.shape[0])

    def nbytes(self) -> int:
        n = self.offsets.nbytes + self.f_rids.nbytes
        if self.ext_rids is not None:
            n += self.ext_rids.nbytes
        return n

    def degree(self, p_rid: int) -> int:
        return int(self.offsets[p_rid + 1] - self.offsets[p_rid])

    def lookup(self, p_rid: int) -> np.ndarray:
        """F-RIDs joining one P row (the adjacency list of ``p_rid``)."""
        return self.f_rids[self.offsets[p_rid] : self.offsets[p_rid + 1]]

    def _gather_idx(self, p_rids: np.ndarray) -> tuple[np.ndarray, np.ndarray]:
        """Ragged-gather positions for a batch of keys.

        Returns (repeat_of_input_positions, flat CSR positions) so callers can
        align gathered entries back to their input rows.
        """
        p_rids = np.asarray(p_rids, dtype=np.int64)
        starts = self.offsets[p_rids]
        cnt = self.offsets[p_rids + 1] - starts
        total = int(cnt.sum())
        if total == 0:
            return np.empty(0, dtype=np.int64), np.empty(0, dtype=np.int64)
        rep = np.repeat(np.arange(p_rids.shape[0], dtype=np.int64), cnt)
        within = np.arange(total, dtype=np.int64) - np.repeat(np.cumsum(cnt) - cnt, cnt)
        return rep, starts[rep] + within

    def lookup_many(self, p_rids: np.ndarray) -> np.ndarray:
        """Concatenated F-RIDs for a batch of P-RIDs (duplicates preserved)."""
        _, gidx = self._gather_idx(p_rids)
        return self.f_rids[gidx]

    def pairs(self, p_rids: np.ndarray) -> tuple[np.ndarray, np.ndarray, np.ndarray]:
        """(p_rid, f_rid, p2_rid) triples for a batch of P-RIDs, one per F row
        — the join-merging access path (requires the extended index). Bag
        semantics are preserved: a (p1, p2) pair appears once per F row."""
        if self.ext_rids is None:
            raise ValueError("pairs() requires an extended RID index")
        p_rids = np.asarray(p_rids, dtype=np.int64)
        rep, gidx = self._gather_idx(p_rids)
        return p_rids[rep], self.f_rids[gidx], self.ext_rids[gidx]

    def extend(self, p_rids: np.ndarray) -> tuple[np.ndarray, np.ndarray, np.ndarray]:
        """GDBMS-style EXTEND over a batch of bound node RIDs: returns
        (input_row_positions, f_rids, ext_rids_or_f_rids) where the first array
        maps each output entry back to its input row. Used by the INLJ
        executor (adjacency-list lookup — random access into the index)."""
        rep, gidx = self._gather_idx(p_rids)
        ext = self.ext_rids[gidx] if self.ext_rids is not None else self.f_rids[gidx]
        return rep, self.f_rids[gidx], ext
