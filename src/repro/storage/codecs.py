"""Compression substrate for COMPREDICT (§V).

Real codecs (gzip / snappy / lz4 via ``pyarrow.Codec``) applied to the two
data layouts the paper studies:

- **row store**: the partition serialised as CSV bytes, then compressed with
  a codec ("gzip", "snappy" columns of Table VI);
- **column store**: the partition written as a Parquet file with the codec
  as the parquet compression ("parquet + gzip" etc.). The ratio denominator
  is the *uncompressed* parquet file so the ratio isolates the codec, as in
  the paper where both layouts start from the same logical data.

Measured quantities per (partition, scheme):

- ``ratio``      — uncompressed bytes / compressed bytes (R_i^k, >= 1 usually);
- ``decomp_sec_per_gb`` — wall-clock decompression time normalised to 1 GB
  (the unit of Table VIII), measured over ``repeats`` runs taking the min
  (least-noise estimator for CPU-bound work).
"""
from __future__ import annotations

import io
import time
from dataclasses import dataclass

import pandas as pd
import pyarrow as pa
import pyarrow.parquet as pq

#: Codec names accepted by pyarrow for both buffer codecs and parquet.
CODECS = ("gzip", "snappy", "lz4")
#: Scheme identifiers as the paper's tables name them.
ROW_SCHEMES = tuple(f"csv+{c}" for c in CODECS)
COL_SCHEMES = tuple(f"parquet+{c}" for c in CODECS)
ALL_SCHEMES = ROW_SCHEMES + COL_SCHEMES
#: The mandatory 'no compression' option of OPTASSIGN (§IV-A).
NO_COMPRESSION = "none"

_PARQUET_CODEC = {"gzip": "gzip", "snappy": "snappy", "lz4": "lz4"}


@dataclass(frozen=True)
class CompressionMeasurement:
    """Ground-truth compression performance of one scheme on one partition."""

    scheme: str
    raw_bytes: int
    compressed_bytes: int
    compress_sec: float
    decomp_sec: float

    @property
    def ratio(self) -> float:
        return self.raw_bytes / max(1, self.compressed_bytes)

    @property
    def decomp_sec_per_gb(self) -> float:
        return self.decomp_sec / max(1e-12, self.raw_bytes / 2**30)


def split_scheme(scheme: str) -> tuple[str, str]:
    """``'parquet+gzip' -> ('parquet', 'gzip')``; validates the name."""
    layout, _, codec = scheme.partition("+")
    if layout not in ("csv", "parquet") or codec not in CODECS:
        raise ValueError(f"unknown scheme {scheme!r}")
    return layout, codec


def csv_bytes(pdf: pd.DataFrame) -> bytes:
    """Row-store serialisation of a partition (CSV, no index)."""
    buf = io.StringIO()
    pdf.to_csv(buf, index=False)
    return buf.getvalue().encode()


def parquet_bytes(pdf: pd.DataFrame, codec: str | None = None) -> bytes:
    """Column-store serialisation; ``codec=None`` writes uncompressed parquet."""
    sink = io.BytesIO()
    table = pa.Table.from_pandas(pdf, preserve_index=False)
    pq.write_table(
        table, sink, compression=_PARQUET_CODEC[codec] if codec else "none"
    )
    return sink.getvalue()


def compress_bytes(raw: bytes, codec: str) -> bytes:
    return pa.Codec(codec).compress(raw, asbytes=True)


def decompress_bytes(blob: bytes, codec: str, raw_len: int) -> bytes:
    return pa.Codec(codec).decompress(blob, raw_len, asbytes=True)


def _timed(fn, repeats: int) -> tuple[float, object]:
    best, out = float("inf"), None
    for _ in range(repeats):
        t0 = time.perf_counter()
        out = fn()
        best = min(best, time.perf_counter() - t0)
    return best, out


def measure(pdf: pd.DataFrame, scheme: str, *, repeats: int = 3) -> CompressionMeasurement:
    """Measure ratio + compress/decompress time of ``scheme`` on ``pdf``."""
    layout, codec = split_scheme(scheme)
    if layout == "csv":
        raw = csv_bytes(pdf)
        c_sec, blob = _timed(lambda: compress_bytes(raw, codec), repeats)
        d_sec, back = _timed(lambda: decompress_bytes(blob, codec, len(raw)), repeats)
        if back != raw:  # pragma: no cover - codec bug guard
            raise RuntimeError(f"{scheme} round-trip mismatch")
        return CompressionMeasurement(scheme, len(raw), len(blob), c_sec, d_sec)
    raw_len = len(parquet_bytes(pdf, codec=None))
    c_sec, blob = _timed(lambda: parquet_bytes(pdf, codec=codec), repeats)

    def _read():
        return pq.read_table(io.BytesIO(blob))

    d_sec, table = _timed(_read, repeats)
    if table.num_rows != len(pdf):  # pragma: no cover - codec bug guard
        raise RuntimeError(f"{scheme} round-trip row-count mismatch")
    return CompressionMeasurement(scheme, raw_len, len(blob), c_sec, d_sec)


def measure_all(
    pdf: pd.DataFrame, schemes: tuple[str, ...] = ALL_SCHEMES, *, repeats: int = 3
) -> dict[str, CompressionMeasurement]:
    """Ground truth for every scheme on one partition (COMPREDICT labels)."""
    return {s: measure(pdf, s, repeats=repeats) for s in schemes}
