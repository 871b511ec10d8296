"""Key re-scaling + simplified recursive-model index (paper §5)."""
from repro.rmi.rescale import KeyRescaler  # noqa: F401
from repro.rmi.rmi import LinearModel, SimplifiedRMI, prediction_stats  # noqa: F401
