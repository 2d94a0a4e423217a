"""The storage service (paper §4.1.4 + §4.2.3 retrieval hot path).

Sample *payloads* live in files (via a ``FileWrapper``); sample *metadata*
(key -> file, index-in-file, label, timestamp) lives in a growing Parquet
registry queried through Spark SQL — the stand-in for the paper's
Postgres database (see DESIGN.md).

Retrieval follows the paper's Figure 6: an incoming list of keys is split
into ``storage_threads`` equal parts; each part runs its *own* metadata
lookup, groups the hits by source file, extracts payloads through the
``FileWrapper``, and emits fixed-size send buffers as soon as they fill.
All payload I/O goes through one bounded process-global thread pool,
which is what makes "too many parallel requests overload the system"
reproducible here.

Two metadata paths, by design (see DESIGN.md):

- ``get_metadata``: a Spark join against the Parquet registry — used by
  selection/scoring *stages* (and tests), where a dataflow stage is the
  right shape.
- ``lookup``: the *hot* per-request path. The paper's Postgres point
  lookups cost milliseconds; a Spark job costs hundreds of milliseconds
  of driver-serialized overhead, which would invert every scaling trend
  of §5.1. So the hot path queries an in-memory index maintained at
  ingest (the DB's role), plus a simulated query latency of
  ``base + per_key * n`` that sleeps (releasing the GIL, like a real
  network round-trip) — preserving the paper's property that metadata
  query time scales with the number of requested keys.
"""
from __future__ import annotations

import os
import queue
import threading
import time
from concurrent.futures import ThreadPoolExecutor
from dataclasses import dataclass
from typing import Iterator, Sequence

import numpy as np
import pandas as pd
from pyspark.sql import DataFrame, SparkSession
from pyspark.sql import functions as F

from repro.storage.file_wrappers import FileWrapper

# Process-global I/O pool: the analog of the paper's bounded Postgres
# worker pool (they configure 96 workers; we scale to local cores). All
# storage requests from all dataloader workers share it, so
# oversubscription (many workers x many storage threads x parallel
# prefetch) queues up here instead of scaling — the effect §5.1.1 measures.
_IO_POOL_SIZE = int(os.environ.get("REPRO_STORAGE_POOL", "16"))
_IO_POOL = ThreadPoolExecutor(max_workers=_IO_POOL_SIZE, thread_name_prefix="storage-io")

# Simulated metadata-DB query latency for the hot path (see module doc):
# a fixed per-query cost plus a per-requested-key cost, as measured for
# the paper's Postgres path ("the duration of the join of the metadata
# tables scales with the number of requested keys", §5.1.1).
_DB_BASE_S = float(os.environ.get("REPRO_DB_BASE_MS", "2.0")) / 1e3
_DB_PER_KEY_S = float(os.environ.get("REPRO_DB_PER_KEY_US", "20.0")) / 1e6

_REGISTRY_SCHEMA = ["sample_key", "file_id", "idx", "label", "timestamp"]


@dataclass
class SampleBuffer:
    """One send buffer emitted by the storage (gRPC-streaming analog)."""

    keys: np.ndarray  # int64
    labels: np.ndarray  # int64
    payloads: list[bytes]

    def __len__(self) -> int:
        return len(self.payloads)

    @staticmethod
    def concat(buffers: Sequence["SampleBuffer"]) -> "SampleBuffer":
        if not buffers:
            return SampleBuffer(
                np.empty(0, np.int64), np.empty(0, np.int64), []
            )
        return SampleBuffer(
            np.concatenate([b.keys for b in buffers]),
            np.concatenate([b.labels for b in buffers]),
            [p for b in buffers for p in b.payloads],
        )


class Storage:
    """Sample storage with a Spark-Parquet metadata registry.

    ``root`` is the directory holding the registry; payload files may live
    anywhere on the local filesystem. One ``Storage`` instance manages one
    dataset, like one dataset registration in the paper.
    """

    def __init__(
        self,
        spark: SparkSession,
        root: str,
        file_wrapper: FileWrapper,
        *,
        send_buffer_size: int = 8192,
    ) -> None:
        self.spark = spark
        self.root = root
        self.file_wrapper = file_wrapper
        self.send_buffer_size = send_buffer_size
        self.registry_path = os.path.join(root, "registry")
        self._files: dict[int, str] = {}  # file_id -> path (small; driver cache)
        self._next_key = 0
        self._next_file_id = 0
        self._lock = threading.Lock()
        # In-memory metadata index for the hot path (keys are dense, so
        # position == sample_key); chunks are consolidated lazily.
        self._idx_file: list[np.ndarray] = []
        self._idx_pos: list[np.ndarray] = []
        self._idx_label: list[np.ndarray] = []
        os.makedirs(root, exist_ok=True)

    def _index(self) -> tuple[np.ndarray, np.ndarray, np.ndarray]:
        with self._lock:
            if len(self._idx_file) > 1:
                self._idx_file = [np.concatenate(self._idx_file)]
                self._idx_pos = [np.concatenate(self._idx_pos)]
                self._idx_label = [np.concatenate(self._idx_label)]
            if not self._idx_file:
                empty = np.empty(0, np.int64)
                return empty, empty, empty
            return self._idx_file[0], self._idx_pos[0], self._idx_label[0]

    # ----------------------------------------------------------- ingestion
    def ingest_files(
        self,
        paths: Sequence[str],
        *,
        timestamps: Sequence[int] | None = None,
    ) -> np.ndarray:
        """Register a batch of payload files; returns the new sample keys.

        Mirrors the paper's ingest: each file is opened through the
        wrapper, its samples and labels extracted, and one bulk append
        (the COPY analog) is written to the Parquet registry.
        ``timestamps`` gives one arrival timestamp per *file* (all samples
        of a file share it), defaulting to 0.
        """
        if timestamps is not None and len(timestamps) != len(paths):
            raise ValueError("one timestamp per file required")
        frames = []
        all_keys = []
        with self._lock:
            for i, path in enumerate(paths):
                n = self.file_wrapper.get_number_of_samples(path)
                labels = self.file_wrapper.get_labels(path)
                if len(labels) != n:
                    raise ValueError(
                        f"{path}: {n} samples but {len(labels)} labels"
                    )
                file_id = self._next_file_id
                self._next_file_id += 1
                keys = np.arange(self._next_key, self._next_key + n, dtype=np.int64)
                self._next_key += n
                self._files[file_id] = path
                ts = int(timestamps[i]) if timestamps is not None else 0
                self._idx_file.append(np.full(n, file_id, np.int64))
                self._idx_pos.append(np.arange(n, dtype=np.int64))
                self._idx_label.append(labels.astype(np.int64))
                frames.append(
                    pd.DataFrame(
                        {
                            "sample_key": keys,
                            "file_id": np.full(n, file_id, np.int64),
                            "idx": np.arange(n, dtype=np.int64),
                            "label": labels.astype(np.int64),
                            "timestamp": np.full(n, ts, np.int64),
                        }
                    )
                )
                all_keys.append(keys)
        batch = pd.concat(frames, ignore_index=True)
        self.spark.createDataFrame(batch).coalesce(1).write.mode("append").parquet(
            self.registry_path
        )
        self._append_files_meta(frames, paths)
        return np.concatenate(all_keys)

    def ingest_file(self, path: str, *, timestamp: int = 0) -> np.ndarray:
        """Register a single payload file (convenience wrapper)."""
        return self.ingest_files([path], timestamps=[timestamp])

    def _append_files_meta(self, frames: list[pd.DataFrame], paths: Sequence[str]) -> None:
        meta = pd.DataFrame(
            {
                "file_id": [int(f["file_id"].iloc[0]) for f in frames],
                "path": list(paths),
                "n_samples": [len(f) for f in frames],
            }
        )
        self.spark.createDataFrame(meta).coalesce(1).write.mode("append").parquet(
            os.path.join(self.root, "files_meta")
        )

    # ----------------------------------------------------------- metadata
    def registry_df(self) -> DataFrame:
        """The growing registry as a Spark DataFrame (Parquet scan)."""
        return self.spark.read.parquet(self.registry_path)

    @property
    def num_samples(self) -> int:
        return self._next_key

    def get_metadata(self, keys: np.ndarray) -> pd.DataFrame:
        """key -> (file_id, idx, label) for the given keys, via a Spark join.

        This is the per-request "Postgres query" of the paper: its cost
        scales with both registry size and the number of requested keys.
        """
        if len(keys) == 0:
            return pd.DataFrame(columns=_REGISTRY_SCHEMA).astype("int64")
        want = self.spark.createDataFrame(
            pd.DataFrame({"sample_key": np.asarray(keys, np.int64)})
        )
        hit = self.registry_df().join(F.broadcast(want), "sample_key", "inner")
        pdf = hit.select("sample_key", "file_id", "idx", "label", "timestamp").toPandas()
        if len(pdf) != len(keys):
            missing = set(np.asarray(keys).tolist()) - set(pdf["sample_key"].tolist())
            raise KeyError(f"unknown sample keys (first few): {sorted(missing)[:5]}")
        return pdf

    def new_data_batches(
        self, *, batch_size: int
    ) -> Iterator[tuple[np.ndarray, np.ndarray, np.ndarray]]:
        """Replay all samples ordered by (timestamp, key) in batches.

        This is the paper's *experiment mode*: the storage announces
        existing data points as "new" to the supervisor, ordered by time.
        Yields ``(keys, timestamps, labels)`` arrays of ``batch_size``.
        """
        pdf = (
            self.registry_df()
            .select("sample_key", "timestamp", "label")
            .orderBy("timestamp", "sample_key")
            .toPandas()
        )
        for start in range(0, len(pdf), batch_size):
            chunk = pdf.iloc[start : start + batch_size]
            yield (
                chunk["sample_key"].to_numpy(np.int64),
                chunk["timestamp"].to_numpy(np.int64),
                chunk["label"].to_numpy(np.int64),
            )

    # ----------------------------------------------------------- retrieval
    def lookup(
        self, keys: np.ndarray
    ) -> tuple[np.ndarray, np.ndarray, np.ndarray]:
        """Hot-path metadata lookup: (file_id, idx, label) per key.

        Served from the in-memory index the ingest maintains, plus a
        simulated DB round-trip latency scaling with the request size
        (see module doc). Raises ``KeyError`` for unknown keys.
        """
        keys = np.asarray(keys, np.int64)
        file_by_key, pos_by_key, label_by_key = self._index()
        if len(keys) and (keys.min() < 0 or keys.max() >= len(file_by_key)):
            bad = keys[(keys < 0) | (keys >= len(file_by_key))]
            raise KeyError(f"unknown sample keys (first few): {bad[:5].tolist()}")
        time.sleep(_DB_BASE_S + _DB_PER_KEY_S * len(keys))
        return file_by_key[keys], pos_by_key[keys], label_by_key[keys]

    def _retrieve_part(
        self, keys: np.ndarray, out: "queue.Queue[SampleBuffer | None]"
    ) -> None:
        """One storage thread: metadata lookup, then per-file extraction
        into send buffers (paper Fig. 6)."""
        file_ids, positions, labels = self.lookup(keys)
        order = np.lexsort((positions, file_ids))  # sorted by file
        keys, file_ids, positions, labels = (
            keys[order], file_ids[order], positions[order], labels[order]
        )
        pending: list[SampleBuffer] = []
        pend_n = 0

        def _flush() -> None:
            nonlocal pend_n
            if pending:
                out.put(SampleBuffer.concat(pending))
                pending.clear()
                pend_n = 0

        bounds = np.flatnonzero(np.diff(file_ids)) + 1
        for chunk in np.split(np.arange(len(keys)), bounds):
            if not len(chunk):
                continue
            path = self._files[int(file_ids[chunk[0]])]
            payloads = self.file_wrapper.get_samples(path, positions[chunk])
            # emit in send-buffer-sized pieces as they fill
            start = 0
            while start < len(chunk):
                take = min(self.send_buffer_size - pend_n, len(chunk) - start)
                sl = chunk[start : start + take]
                pending.append(
                    SampleBuffer(keys[sl], labels[sl], payloads[start : start + take])
                )
                pend_n += take
                start += take
                if pend_n >= self.send_buffer_size:
                    _flush()
        _flush()

    def retrieve_stream(
        self, keys: np.ndarray, *, storage_threads: int = 1
    ) -> Iterator[SampleBuffer]:
        """Stream send buffers for an arbitrary key set.

        The key list is split into ``storage_threads`` equal parts; each
        part is a task on the global I/O pool running its own metadata
        query + file reads. Buffers are yielded as they become available
        (the trainer "fetches data as soon as available", §4.2.1).
        """
        keys = np.asarray(keys, np.int64)
        if storage_threads < 1:
            raise ValueError("storage_threads must be >= 1")
        if len(keys) == 0:
            return
        parts = [p for p in np.array_split(keys, storage_threads) if len(p)]
        out: "queue.Queue[SampleBuffer | None]" = queue.Queue()

        def _run(part: np.ndarray) -> None:
            try:
                self._retrieve_part(part, out)
            finally:
                out.put(None)

        futures = [_IO_POOL.submit(_run, p) for p in parts]
        done = 0
        while done < len(parts):
            item = out.get()
            if item is None:
                done += 1
            else:
                yield item
        for f in futures:  # surface worker exceptions
            f.result()

    def get_samples(
        self, keys: np.ndarray, *, storage_threads: int = 1
    ) -> SampleBuffer:
        """All requested samples as one buffer (order not guaranteed)."""
        return SampleBuffer.concat(
            list(self.retrieve_stream(keys, storage_threads=storage_threads))
        )
