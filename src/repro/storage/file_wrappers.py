"""File wrappers: extract individual samples + labels from files (§4.1.4).

Each ingested file contains one or more samples. The wrapper knows the
file format and returns raw sample payload bytes; converting bytes to
model input is the pipeline's ``bytes_parser_function`` (§3.5), not the
wrapper's job. Three wrappers, as in the paper:

- ``BinaryFileWrapper``   — fixed-row-size binary files (recommender data)
- ``CsvFileWrapper``      — variable-length CSV rows
- ``SingleSampleFileWrapper`` — one sample per file (e.g. a JPEG), label
  in a ``<path>.label`` sidecar file
"""
from __future__ import annotations

from abc import ABC, abstractmethod
from typing import Sequence

import numpy as np

from repro.storage.filesystem import FilesystemWrapper, LocalFilesystemWrapper


class FileWrapper(ABC):
    """Format-specific sample extraction over a ``FilesystemWrapper``."""

    def __init__(self, fs: FilesystemWrapper | None = None) -> None:
        self.fs = fs or LocalFilesystemWrapper()

    @abstractmethod
    def get_number_of_samples(self, path: str) -> int:
        """Number of samples stored in the file at ``path``."""

    @abstractmethod
    def get_samples(self, path: str, indices: Sequence[int]) -> list[bytes]:
        """Payload bytes for the samples at ``indices`` within ``path``."""

    @abstractmethod
    def get_all_samples(self, path: str) -> list[bytes]:
        """Payload bytes for every sample in ``path``, in file order."""

    @abstractmethod
    def get_labels(self, path: str) -> np.ndarray:
        """int64 label per sample in ``path``, in file order."""


class BinaryFileWrapper(FileWrapper):
    """Fixed-size-record binary files described by a numpy dtype.

    The label lives in a named field of the record (default ``label``),
    as in the paper's recommendation-system layout where the 160 B Criteo
    record embeds its label. Index-based access seeks to
    ``index * record_size`` instead of loading the whole file — the
    analog of the paper's optimized ``std::ifstream`` path.
    """

    def __init__(
        self,
        record_dtype: np.dtype,
        *,
        label_field: str = "label",
        fs: FilesystemWrapper | None = None,
    ) -> None:
        super().__init__(fs)
        self.record_dtype = np.dtype(record_dtype)
        self.label_field = label_field
        if label_field not in (self.record_dtype.names or ()):
            raise ValueError(
                f"label field {label_field!r} not in record dtype fields "
                f"{self.record_dtype.names}"
            )

    @property
    def record_size(self) -> int:
        return self.record_dtype.itemsize

    def write(self, path: str, records: np.ndarray) -> None:
        """Persist a structured array of records (one contiguous write)."""
        if records.dtype != self.record_dtype:
            raise ValueError(
                f"records dtype {records.dtype} != wrapper dtype {self.record_dtype}"
            )
        self.fs.put(path, records.tobytes())

    def get_number_of_samples(self, path: str) -> int:
        size = self.fs.size(path)
        if size % self.record_size:
            raise ValueError(
                f"{path}: size {size} not a multiple of record size {self.record_size}"
            )
        return size // self.record_size

    def get_samples(self, path: str, indices: Sequence[int]) -> list[bytes]:
        rs = self.record_size
        n = self.get_number_of_samples(path)
        idx = np.asarray(indices, dtype=np.int64)
        if len(idx) == 0:
            return []
        if idx.min() < 0 or idx.max() >= n:
            bad = idx[(idx < 0) | (idx >= n)][0]
            raise IndexError(f"{path}: sample index {bad} out of range [0, {n})")
        lo, hi = int(idx.min()), int(idx.max()) + 1
        # Dense-enough request: one read of the covering span, then
        # in-memory slicing — a single syscall instead of one per record
        # (the paper's buffered-ifstream optimization).
        if (hi - lo) <= 16 * len(idx):
            span = self.fs.get_range(path, lo * rs, (hi - lo) * rs)
            return [bytes(span[(i - lo) * rs : (i - lo + 1) * rs]) for i in idx]
        # Sparse request: sorted per-record reads on one open handle.
        order = np.argsort(idx, kind="stable")
        chunks = self.fs.get_ranges(path, idx[order] * rs, rs)
        out: list[bytes] = [b""] * len(idx)
        for pos, payload in zip(order, chunks):
            out[pos] = payload
        return out

    def get_all_samples(self, path: str) -> list[bytes]:
        data = self.fs.get(path)
        rs = self.record_size
        return [data[i : i + rs] for i in range(0, len(data), rs)]

    def read_records(self, path: str) -> np.ndarray:
        """The whole file as a structured array (baseline sequential path)."""
        return np.frombuffer(self.fs.get(path), dtype=self.record_dtype)

    def get_labels(self, path: str) -> np.ndarray:
        recs = self.read_records(path)
        return recs[self.label_field].astype(np.int64)


class CsvFileWrapper(FileWrapper):
    """CSV files: one sample per row, label in a configurable column.

    The payload of a sample is the raw row bytes with the label column
    removed, so the bytes parser sees only features. Variable-length rows
    are supported (the paper's motivating case).
    """

    def __init__(
        self,
        *,
        label_column: int = 0,
        separator: str = ",",
        has_header: bool = False,
        fs: FilesystemWrapper | None = None,
    ) -> None:
        super().__init__(fs)
        self.label_column = label_column
        self.separator = separator
        self.has_header = has_header

    def _rows(self, path: str) -> list[str]:
        text = self.fs.get(path).decode("utf-8")
        rows = [r for r in text.splitlines() if r]
        return rows[1:] if self.has_header else rows

    def get_number_of_samples(self, path: str) -> int:
        return len(self._rows(path))

    def _payload(self, row: str) -> bytes:
        parts = row.split(self.separator)
        del parts[self.label_column]
        return self.separator.join(parts).encode("utf-8")

    def get_samples(self, path: str, indices: Sequence[int]) -> list[bytes]:
        rows = self._rows(path)
        return [self._payload(rows[i]) for i in indices]

    def get_all_samples(self, path: str) -> list[bytes]:
        return [self._payload(r) for r in self._rows(path)]

    def get_labels(self, path: str) -> np.ndarray:
        labels = [
            int(r.split(self.separator)[self.label_column]) for r in self._rows(path)
        ]
        return np.asarray(labels, dtype=np.int64)


class SingleSampleFileWrapper(FileWrapper):
    """Files containing exactly one sample (e.g. a JPEG image).

    The label is stored in a ``<path>.label`` sidecar file, matching the
    paper's CLOC setup ("each sample is stored in an individual JPEG file
    and a corresponding label file").
    """

    LABEL_SUFFIX = ".label"

    def write(self, path: str, payload: bytes, label: int) -> None:
        self.fs.put(path, payload)
        self.fs.put(path + self.LABEL_SUFFIX, str(int(label)).encode("utf-8"))

    def get_number_of_samples(self, path: str) -> int:
        return 1

    def get_samples(self, path: str, indices: Sequence[int]) -> list[bytes]:
        for i in indices:
            if i != 0:
                raise IndexError(f"{path}: single-sample file has no index {i}")
        data = self.fs.get(path)
        return [data for _ in indices]

    def get_all_samples(self, path: str) -> list[bytes]:
        return [self.fs.get(path)]

    def get_labels(self, path: str) -> np.ndarray:
        raw = self.fs.get(path + self.LABEL_SUFFIX)
        return np.asarray([int(raw.decode("utf-8"))], dtype=np.int64)
