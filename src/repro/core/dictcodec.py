"""Dictionary coding stage (§6.2.2, last stage): Zstd.

The paper uses Zstd [63] as its dictionary coder; pyarrow bundles the
real libzstd, so this *is* Zstd, not a stand-in. The raw length is
stored in a prefix because pyarrow's decompress wants it up front.
"""
from __future__ import annotations

import struct

import pyarrow as pa

_CODEC = pa.Codec("zstd")
_LEN = struct.Struct("<Q")


def compress(data: bytes) -> bytes:
    return _LEN.pack(len(data)) + _CODEC.compress(data, asbytes=True)


def decompress(data: bytes) -> bytes:
    (raw_len,) = _LEN.unpack_from(data, 0)
    if raw_len == 0:
        return b""
    return _CODEC.decompress(data[_LEN.size :], raw_len, asbytes=True)
