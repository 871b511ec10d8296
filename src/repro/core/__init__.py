"""LIDER's core: spherical k-means, the core model, and the two-layer index."""
from repro.core.kmeans import spherical_kmeans, assign_clusters  # noqa: F401
from repro.core.core_model import CoreModel, CoreModelConfig  # noqa: F401
from repro.core.lider import LIDER, LIDERConfig  # noqa: F401
