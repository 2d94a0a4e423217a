"""Model repository (paper §4.1.3).

numpy-based stand-ins for the paper's PyTorch models (see DESIGN.md
substitutions): ``SoftmaxRegression`` for the CLOC vision workload and
``DlrmLite`` for the Criteo recommendation workload. Models expose
per-sample losses and last-layer gradient norms, the internals the paper
requires for downsampling support.
"""
from repro.models.base import Model
from repro.models.dlrm_lite import DlrmLite
from repro.models.softmax import SoftmaxRegression

__all__ = ["Model", "SoftmaxRegression", "DlrmLite"]
