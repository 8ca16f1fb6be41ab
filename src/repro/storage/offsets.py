"""Var-byte offset-list encoding (Section 4.3).

"Offsets are variable-length, and we encode all offsets in an offset
list with the maximum number of bytes needed for each offset.  This
encoding size is stored as a single byte header in the beginning of
each offset list."
"""
from __future__ import annotations

import numpy as np

_WIDTHS = (1, 2, 4)
_DTYPES = {1: "<u1", 2: "<u2", 4: "<u4"}


def offset_width(max_offset: int) -> int:
    """Bytes per offset for a list whose largest offset is given."""
    if max_offset < 0:
        raise ValueError("offsets must be non-negative")
    for w in _WIDTHS:
        if max_offset < (1 << (8 * w)):
            return w
    raise ValueError(f"offset {max_offset} exceeds 4-byte addressing")


def encode_offset_list(offsets: np.ndarray | list[int]) -> bytes:
    """Encode one offset list: 1-byte width header + fixed-width body."""
    arr = np.asarray(offsets, dtype=np.int64)
    if arr.size == 0:
        return bytes([1])
    w = offset_width(int(arr.max()))
    return bytes([w]) + arr.astype(_DTYPES[w]).tobytes()


def decode_offset_list(buf: bytes) -> np.ndarray:
    """Decode an offset list back to an int64 array."""
    if not buf:
        raise ValueError("empty buffer")
    w = buf[0]
    if w not in _DTYPES:
        raise ValueError(f"bad width header {w}")
    return np.frombuffer(buf[1:], dtype=_DTYPES[w]).astype(np.int64)


def encoded_size(n: int, max_offset: int) -> int:
    """Size in bytes of an encoded list without materializing it."""
    if n == 0:
        return 1
    return 1 + n * offset_width(max_offset)
