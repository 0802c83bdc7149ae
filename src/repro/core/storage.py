"""PairwiseHist storage encoding — Sec. 4.3, Fig. 6, Eqs. 11–13.

Bin midpoints and weighted-centre bounds are *not* stored (re-derivable).
Bin counts use ``l_h = ceil(log2(1 + max_count))`` bits each (Eq. 13),
stored either densely bit-packed or sparsely (Golomb-coded deltas of the
non-zero indices + packed values), whichever is smaller — the
dense/sparse indicator is one flag byte per histogram. Edges are stored
as float32 deltas are unnecessary — edge values are dyadic midpoints, and
metadata (min/max per bin) are ``m``-byte integers with unique counts as
varints.

``serialize``/``deserialize`` round-trip a full synopsis exactly;
``eq12_bound`` evaluates the paper's storage upper bound for comparison.
"""
from __future__ import annotations

import math
import struct

import numpy as np

from repro.core.model import Hist1D, Hist2D, MarginalMeta, PairwiseHist

_MAGIC = b"PWH1"


# ---------------------------------------------------------------------------
# Bit-level primitives


class BitWriter:
    def __init__(self) -> None:
        self._bits: list[np.ndarray] = []

    def write_bits(self, values: np.ndarray, width: int) -> None:
        """Append ``width`` low bits of every value (vectorized)."""
        if width == 0 or len(values) == 0:
            return
        v = np.asarray(values, dtype=np.uint64)
        shifts = np.arange(width - 1, -1, -1, dtype=np.uint64)  # MSB first
        bits = ((v[:, None] >> shifts[None, :]) & np.uint64(1)).astype(np.uint8)
        self._bits.append(bits.reshape(-1))

    def write_unary(self, q: int) -> None:
        """q ones followed by a zero (Golomb quotient)."""
        arr = np.ones(q + 1, dtype=np.uint8)
        arr[-1] = 0
        self._bits.append(arr)

    def getvalue(self) -> bytes:
        if not self._bits:
            return b""
        allbits = np.concatenate(self._bits)
        return np.packbits(allbits).tobytes()

    @property
    def n_bits(self) -> int:
        return sum(len(b) for b in self._bits)


class BitReader:
    def __init__(self, data: bytes, n_bits: int | None = None):
        arr = np.frombuffer(data, dtype=np.uint8)
        self.bits = np.unpackbits(arr)
        if n_bits is not None:
            self.bits = self.bits[:n_bits]
        self.pos = 0

    def read_bits(self, n_values: int, width: int) -> np.ndarray:
        if width == 0 or n_values == 0:
            return np.zeros(n_values, dtype=np.int64)
        need = n_values * width
        chunk = self.bits[self.pos : self.pos + need].reshape(n_values, width)
        self.pos += need
        shifts = np.arange(width - 1, -1, -1, dtype=np.uint64)
        return (chunk.astype(np.uint64) << shifts[None, :]).sum(axis=1).astype(np.int64)

    def read_unary(self) -> int:
        q = 0
        while self.bits[self.pos] == 1:
            q += 1
            self.pos += 1
        self.pos += 1
        return q


def golomb_parameter(values: np.ndarray) -> int:
    """Near-optimal Golomb divisor for geometric data: M ~ 0.69 * mean."""
    if len(values) == 0:
        return 1
    return max(1, int(round(0.69 * (float(np.mean(values)) + 1.0))))


def golomb_encode(writer: BitWriter, values: np.ndarray, m: int) -> None:
    """Golomb–Rice-style coding: unary quotient + fixed-width remainder
    (a power-of-two divisor keeps the remainder decodable vectorially,
    at a fraction-of-a-bit cost vs. the exact truncated code)."""
    b = max(1, 1 << max(0, int(math.ceil(math.log2(m))))) if m > 1 else 1
    width = int(math.log2(b)) if b > 1 else 0
    for v in np.asarray(values, dtype=np.int64):
        q, r = divmod(int(v), b)
        writer.write_unary(q)
        if width:
            writer.write_bits(np.array([r]), width)


def golomb_decode(reader: BitReader, n: int, m: int) -> np.ndarray:
    b = max(1, 1 << max(0, int(math.ceil(math.log2(m))))) if m > 1 else 1
    width = int(math.log2(b)) if b > 1 else 0
    out = np.empty(n, dtype=np.int64)
    for i in range(n):
        q = reader.read_unary()
        r = int(reader.read_bits(1, width)[0]) if width else 0
        out[i] = q * b + r
    return out


# ---------------------------------------------------------------------------
# Count matrices (dense vs. sparse, Fig. 6)


def bits_per_count(counts: np.ndarray) -> int:
    """Eq. 13: ``l_h = ceil(log2(1 + max count))``."""
    mx = int(counts.max(initial=0))
    return max(1, math.ceil(math.log2(1 + mx)))


def _encode_counts(flat: np.ndarray) -> bytes:
    lh = bits_per_count(flat)
    nz = np.flatnonzero(flat)
    dense = BitWriter()
    dense.write_bits(flat, lh)
    dense_bytes = dense.getvalue()
    sparse = BitWriter()
    if len(nz):
        gaps = np.diff(np.concatenate(([-1], nz))) - 1
        gm = golomb_parameter(gaps)
        golomb_encode(sparse, gaps, gm)
        sparse.write_bits(flat[nz], lh)
    else:
        gm = 1
    sparse_bytes = sparse.getvalue()
    use_sparse = len(sparse_bytes) + 4 < len(dense_bytes)
    header = struct.pack(
        "<BBHI", 1 if use_sparse else 0, lh, gm if use_sparse else 0, len(nz)
    )
    return header + (sparse_bytes if use_sparse else dense_bytes)


def _decode_counts(buf: bytes, offset: int, n: int) -> tuple[np.ndarray, int]:
    use_sparse, lh, gm, n_nz = struct.unpack_from("<BBHI", buf, offset)
    offset += struct.calcsize("<BBHI")
    if not use_sparse:
        n_bytes = math.ceil(n * lh / 8)
        reader = BitReader(buf[offset : offset + n_bytes])
        flat = reader.read_bits(n, lh)
        return flat, offset + n_bytes
    # sparse: size unknown a priori — read generously, track bit position.
    reader = BitReader(buf[offset:])
    gaps = golomb_decode(reader, n_nz, gm)
    vals = reader.read_bits(n_nz, lh)
    used_bytes = math.ceil(reader.pos / 8)
    flat = np.zeros(n, dtype=np.int64)
    idx = np.cumsum(gaps + 1) - 1
    flat[idx] = vals
    return flat, offset + used_bytes


# ---------------------------------------------------------------------------
# Arrays / metadata


def _pack_f64(arr: np.ndarray) -> bytes:
    """Pack floats choosing the narrowest exact width (the paper's
    per-dimension m bytes): float32 when every value is exactly
    representable (values below 2^24 at the dyadic grid), else float64."""
    a = np.asarray(arr, dtype="<f8")
    a32 = a.astype("<f4")
    if len(a) and np.array_equal(a32.astype("<f8"), a):
        return struct.pack("<IB", len(a), 4) + a32.tobytes()
    return struct.pack("<IB", len(a), 8) + a.tobytes()


def _unpack_f64(buf: bytes, offset: int) -> tuple[np.ndarray, int]:
    n, width = struct.unpack_from("<IB", buf, offset)
    offset += 5
    dtype = "<f4" if width == 4 else "<f8"
    arr = np.frombuffer(buf, dtype=dtype, count=n, offset=offset).astype("<f8")
    return arr, offset + width * n


def _pack_meta(vmin: np.ndarray, vmax: np.ndarray, uniq: np.ndarray) -> bytes:
    return _pack_f64(vmin) + _pack_f64(vmax) + _pack_f64(uniq.astype(np.float64))


def _unpack_meta(buf: bytes, offset: int):
    vmin, offset = _unpack_f64(buf, offset)
    vmax, offset = _unpack_f64(buf, offset)
    uniq, offset = _unpack_f64(buf, offset)
    return vmin, vmax, uniq.astype(np.int64), offset


def _pack_hist1d(h: Hist1D) -> bytes:
    return (
        _pack_f64(h.edges)
        + _pack_meta(h.vmin, h.vmax, h.uniq)
        + _encode_counts(h.counts.astype(np.int64))
    )


def _unpack_hist1d(buf: bytes, offset: int) -> tuple[Hist1D, int]:
    edges, offset = _unpack_f64(buf, offset)
    vmin, vmax, uniq, offset = _unpack_meta(buf, offset)
    counts, offset = _decode_counts(buf, offset, len(edges) - 1)
    return Hist1D(edges, counts, vmin, vmax, uniq), offset


def _pack_hist2d(h: Hist2D) -> bytes:
    head = struct.pack("<II", h.i, h.j)
    return (
        head
        + _pack_f64(h.edges_i)
        + _pack_f64(h.edges_j)
        + _pack_meta(h.meta_i.vmin, h.meta_i.vmax, h.meta_i.uniq)
        + _pack_meta(h.meta_j.vmin, h.meta_j.vmax, h.meta_j.uniq)
        + _encode_counts(h.counts.reshape(-1).astype(np.int64))
    )


def _unpack_hist2d(buf: bytes, offset: int) -> tuple[Hist2D, int]:
    i, j = struct.unpack_from("<II", buf, offset)
    offset += 8
    ei, offset = _unpack_f64(buf, offset)
    ej, offset = _unpack_f64(buf, offset)
    vmin_i, vmax_i, uniq_i, offset = _unpack_meta(buf, offset)
    vmin_j, vmax_j, uniq_j, offset = _unpack_meta(buf, offset)
    ki, kj = len(ei) - 1, len(ej) - 1
    flat, offset = _decode_counts(buf, offset, ki * kj)
    return (
        Hist2D(
            i,
            j,
            ei,
            ej,
            flat.reshape(ki, kj),
            MarginalMeta(vmin_i, vmax_i, uniq_i),
            MarginalMeta(vmin_j, vmax_j, uniq_j),
        ),
        offset,
    )


# ---------------------------------------------------------------------------
# Public API


def serialize(ph: PairwiseHist) -> bytes:
    out = [
        _MAGIC,
        struct.pack("<QQId", ph.n_rows, ph.n_sample, ph.M, ph.alpha),
        struct.pack("<II", ph.d, len(ph.hists2d)),
    ]
    for h in ph.hists1d:
        out.append(_pack_hist1d(h))
    for h in ph.hists2d.values():
        out.append(_pack_hist2d(h))
    return b"".join(out)


def deserialize(buf: bytes) -> PairwiseHist:
    assert buf[:4] == _MAGIC, "bad magic"
    offset = 4
    n_rows, n_sample, M, alpha = struct.unpack_from("<QQId", buf, offset)
    offset += struct.calcsize("<QQId")
    d, n_pairs = struct.unpack_from("<II", buf, offset)
    offset += 8
    hists1d = []
    for _ in range(d):
        h, offset = _unpack_hist1d(buf, offset)
        hists1d.append(h)
    hists2d = {}
    for _ in range(n_pairs):
        h, offset = _unpack_hist2d(buf, offset)
        hists2d[(h.i, h.j)] = h
    return PairwiseHist(n_rows, n_sample, M, alpha, hists1d, hists2d)


def synopsis_bytes(ph: PairwiseHist) -> int:
    """Measured serialized size — the number we report as synopsis size."""
    return len(serialize(ph))


def eq12_bound(ph: PairwiseHist, bytes_per_value: dict[int, int] | None = None) -> int:
    """The paper's storage upper bound (Eq. 12) for comparison: params +
    1-d + 2-d edge/metadata terms + bit-packed counts."""
    d = ph.d
    total = 29 + d + 4 * d * d
    k1 = {i: ph.hists1d[i].k for i in range(d)}
    # sum over i of (3 m_i + 4) * (sum_j k^(i|j) - (d-1) k^(i))
    for i in range(d):
        m_i = (bytes_per_value or {}).get(i, 4)
        sum_k = k1[i]  # the 1-d histogram itself
        for (a, b), h2 in ph.hists2d.items():
            if a == i:
                sum_k += len(h2.edges_i) - 1
            elif b == i:
                sum_k += len(h2.edges_j) - 1
        total += (3 * m_i + 4) * max(0, sum_k - (d - 1) * k1[i])
    for h2 in ph.hists2d.values():
        ki, kj = h2.counts.shape
        total += math.ceil(ki * kj * bits_per_count(h2.counts) / 8)
    for i in range(d):
        total += math.ceil(k1[i] * bits_per_count(ph.hists1d[i].counts) / 8)
    return total
