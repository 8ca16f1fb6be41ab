"""Var-byte offset-list codec (Section 4.3)."""
import numpy as np
import pytest
from hypothesis import given, settings
from hypothesis import strategies as st

from repro.storage.offsets import (
    decode_offset_list,
    encode_offset_list,
    encoded_size,
    offset_width,
)


@pytest.mark.parametrize(
    "mx,w", [(0, 1), (255, 1), (256, 2), (65535, 2), (65536, 4),
             (2**32 - 1, 4)],
)
def test_width_boundaries(mx, w):
    assert offset_width(mx) == w


def test_width_negative_raises():
    with pytest.raises(ValueError):
        offset_width(-1)


def test_width_too_large_raises():
    with pytest.raises(ValueError):
        offset_width(2**32)


def test_empty_list():
    buf = encode_offset_list([])
    assert buf == bytes([1])
    assert decode_offset_list(buf).size == 0


def test_header_is_width():
    assert encode_offset_list([3, 7])[0] == 1
    assert encode_offset_list([3, 300])[0] == 2
    assert encode_offset_list([70000])[0] == 4


def test_size_formula_matches_encoding():
    for offs in ([0], [5, 250], [300, 2], list(range(100)), [100000]):
        assert len(encode_offset_list(offs)) == encoded_size(
            len(offs), max(offs)
        )


@settings(max_examples=200, deadline=None)
@given(st.lists(st.integers(min_value=0, max_value=2**32 - 1), max_size=200))
def test_roundtrip(offsets):
    got = decode_offset_list(encode_offset_list(offsets))
    assert got.tolist() == offsets


def test_typical_list_is_one_or_two_bytes_per_entry():
    """The paper's point: offsets are list-level identifiable, so for
    real-world list sizes (tens to hundreds) each entry costs 1 byte."""
    offs = np.arange(40)
    assert len(encode_offset_list(offs)) == 1 + 40  # 1 B/entry + header


def test_bad_decode_raises():
    with pytest.raises(ValueError):
        decode_offset_list(b"")
    with pytest.raises(ValueError):
        decode_offset_list(bytes([3, 0, 0, 0]))
