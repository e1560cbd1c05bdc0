"""Hash-based baselines HB / HBC-{Z,L} (paper Sec. V-A.3).

Each partition is a serialized Python dict ``{dense_key: (v1, .., vm)}``
— O(1) lookup once resident, but a much larger serialized footprint and
much slower (de)serialization than the array layout, which is exactly
the behaviour the paper reports (HB/HBC are the slowest stores when
partitions must be reloaded, Fig. 7's purple bar).
"""
from __future__ import annotations

from typing import Any

import numpy as np

from .partition_store import PartitionedStore

__all__ = ["HashStore"]

# rough per-entry resident cost of a Python dict entry (key int + tuple)
_DICT_ENTRY_BYTES = 120


class HashStore(PartitionedStore):
    """HB (codec='none'), HBC-Z / HBC-L (byte codecs)."""

    def _make_payload(self, keys: np.ndarray, values: dict[str, np.ndarray]) -> Any:
        cols = list(values)
        tuples = list(zip(*(values[c].tolist() for c in cols))) if cols else [()] * len(keys)
        return {"cols": cols, "map": dict(zip(keys.tolist(), tuples))}

    def _payload_nbytes(self, payload: Any) -> int:
        m = payload["map"]
        width = max(1, len(payload["cols"]))
        return len(m) * _DICT_ENTRY_BYTES * width // 2 + 64

    def _lookup_in_payload(self, payload, keys):
        m = payload["map"]
        cols = payload["cols"]
        mask = np.zeros(len(keys), dtype=bool)
        rows = []
        for i, k in enumerate(keys.tolist()):
            t = m.get(k)
            if t is not None:
                mask[i] = True
                rows.append(t)
        vals = {
            c: np.array([r[j] for r in rows], dtype=object)
            for j, c in enumerate(cols)
        }
        return mask, vals
