"""Model (de)serialization strategies (paper §4.3).

``FullModelStrategy`` stores a model restorable from the file alone (the
I-frame analog); ``WeightsDifferenceStrategy`` stores only the delta from
a base model under a difference operator (the P-frame analog). Both
zlib-compress an ``npz``-style binary payload.
"""
from __future__ import annotations

import io
import zlib

import numpy as np

State = dict[str, np.ndarray]


def _pack(state: State) -> bytes:
    buf = io.BytesIO()
    np.savez(buf, **state)
    return zlib.compress(buf.getvalue(), level=6)


def _unpack(data: bytes) -> State:
    with np.load(io.BytesIO(zlib.decompress(data))) as z:
        return {k: z[k].copy() for k in z.files}


class FullModelStrategy:
    """Self-contained compressed snapshot of the full parameter state."""

    name = "PyTorchFullModel"

    def serialize(self, state: State) -> bytes:
        return _pack(state)

    def deserialize(self, data: bytes) -> State:
        return _unpack(data)


class WeightsDifferenceStrategy:
    """Delta against a base state; deltas of similar models compress well."""

    name = "WeightsDifference"

    def serialize(self, state: State, base: State) -> bytes:
        if set(state) != set(base):
            raise ValueError(
                f"state keys {sorted(state)} != base keys {sorted(base)}"
            )
        delta = {k: state[k].astype(np.float64) - base[k] for k in state}
        return _pack(delta)

    def deserialize(self, data: bytes, base: State) -> State:
        delta = _unpack(data)
        return {k: base[k] + delta[k] for k in delta}
