"""bitshuffle::LZ4 and bitshuffle::zstd (§3.7, Masui et al. 2015).

Workflow: the input is split into blocks (default 4096 bytes, chosen by
the original to fit L1 cache); within each block the element bits are
arranged as an (m × elem_bits) matrix and transposed so the i-th bits of
all elements land in consecutive bytes; a downstream dictionary coder
(LZ4 or zstd) then compresses each transposed block.

Backends (DESIGN.md substitution #2): "LZ4" is this repo's LZ4-style LZ77
(`lz77.py`); "zstd" is stdlib zlib at level 9 (DEFLATE: LZ77 + Huffman,
the same match+entropy-coding family as zstd). The SSE2/AVX2 transpose of
the original is the vectorized `np.unpackbits` transpose here; Spark
partitions provide the thread-level parallelism in the harness.
"""
from __future__ import annotations

import zlib

import numpy as np

from repro.codecs.base import Codec, MethodInfo, register
from repro.codecs.lz77 import lz_compress, lz_decompress
from repro.core.bitio import bitshuffle_bits, bitunshuffle_bits

DEFAULT_BLOCK_BYTES = 4096


class _BitshuffleBase(Codec):
    block_bytes = DEFAULT_BLOCK_BYTES

    # backend hooks -------------------------------------------------------
    def _backend_compress(self, data: bytes) -> bytes:
        raise NotImplementedError

    def _backend_decompress(self, data: bytes) -> bytes:
        raise NotImplementedError

    def _encode(self, words: np.ndarray, dims) -> bytes:
        raw = np.ascontiguousarray(words).view(np.uint8)
        width = words.dtype.itemsize * 8
        out = bytearray()
        for off in range(0, max(raw.size, 1), self.block_bytes):
            block = raw[off : off + self.block_bytes]
            shuffled = bitshuffle_bits(block, width).tobytes()
            comp = self._backend_compress(shuffled)
            out += len(comp).to_bytes(4, "little")
            out += comp
        return bytes(out)

    def _decode(self, payload, dtype, count, dims):
        word_dt = np.uint32 if dtype.itemsize == 4 else np.uint64
        width = dtype.itemsize * 8
        chunks = []
        p = 0
        while p < len(payload):
            clen = int.from_bytes(payload[p : p + 4], "little")
            p += 4
            shuffled = np.frombuffer(self._backend_decompress(payload[p : p + clen]), np.uint8)
            p += clen
            chunks.append(bitunshuffle_bits(shuffled, width))
        raw = np.concatenate(chunks) if chunks else np.zeros(0, np.uint8)
        return np.frombuffer(raw.tobytes(), dtype=word_dt, count=count)


@register
class BitshuffleLZ4(_BitshuffleBase):
    info = MethodInfo(
        name="shf+LZ4", year=2015, domain="HPC", precision="S,D", arch="CPU",
        parallel="SIMD + threads", trait="transform + dict.", group="dictionary",
    )

    def _backend_compress(self, data: bytes) -> bytes:
        return lz_compress(data)

    def _backend_decompress(self, data: bytes) -> bytes:
        return lz_decompress(data)


@register
class BitshuffleZstd(_BitshuffleBase):
    info = MethodInfo(
        name="shf+zstd", year=2015, domain="HPC", precision="S,D", arch="CPU",
        parallel="SIMD + threads", trait="transform + dict.", group="dictionary",
    )

    def _backend_compress(self, data: bytes) -> bytes:
        return zlib.compress(data, 9)

    def _backend_decompress(self, data: bytes) -> bytes:
        return zlib.decompress(data)
