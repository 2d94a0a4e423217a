"""Filesystem wrappers abstracting byte-level I/O (paper §4.1.4).

The paper's storage component goes through ``FileSystemWrapper`` objects
so cloud filesystems (e.g. S3) can be added without touching the sample
extraction logic. We implement the local wrapper; the interface is what
the ``FileWrapper`` layer programs against.
"""
from __future__ import annotations

import os
from abc import ABC, abstractmethod


class FilesystemWrapper(ABC):
    """Byte-stream I/O interface used by the file wrappers."""

    @abstractmethod
    def get(self, path: str) -> bytes:
        """Return the full contents of ``path``."""

    @abstractmethod
    def get_range(self, path: str, offset: int, length: int) -> bytes:
        """Return ``length`` bytes of ``path`` starting at ``offset``."""

    def get_ranges(self, path: str, offsets, length: int) -> list[bytes]:
        """Batched ``get_range``: one chunk of ``length`` bytes per offset.

        Default loops over ``get_range``; implementations should override
        to keep a single open handle (the paper's ifstream-per-file).
        """
        return [self.get_range(path, int(o), length) for o in offsets]

    @abstractmethod
    def put(self, path: str, data: bytes) -> None:
        """Write ``data`` to ``path``, creating parent directories."""

    @abstractmethod
    def size(self, path: str) -> int:
        """Size of ``path`` in bytes."""

    @abstractmethod
    def exists(self, path: str) -> bool:
        """Whether ``path`` exists."""


class LocalFilesystemWrapper(FilesystemWrapper):
    """Local-disk implementation; reads use seeks, not whole-file loads.

    Mirrors the paper's ``BinaryFileWrapper`` operating on
    ``std::ifstream`` "to not load the entire file into memory".
    """

    def get(self, path: str) -> bytes:
        with open(path, "rb") as f:
            return f.read()

    def get_range(self, path: str, offset: int, length: int) -> bytes:
        with open(path, "rb") as f:
            f.seek(offset)
            return f.read(length)

    def get_ranges(self, path: str, offsets, length: int) -> list[bytes]:
        out = []
        with open(path, "rb") as f:
            for o in offsets:
                f.seek(int(o))
                out.append(f.read(length))
        return out

    def put(self, path: str, data: bytes) -> None:
        os.makedirs(os.path.dirname(path), exist_ok=True)
        with open(path, "wb") as f:
            f.write(data)

    def size(self, path: str) -> int:
        return os.path.getsize(path)

    def exists(self, path: str) -> bool:
        return os.path.exists(path)
