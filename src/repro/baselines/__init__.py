"""From-scratch implementations of every baseline in the paper's §7.1.2.

No FAISS/FALCONN binaries exist in this container; each index is built
here so the comparison exercises the same algorithms the paper cites.
"""
from repro.baselines.base import ANNIndex  # noqa: F401
from repro.baselines.flat import FlatIndex  # noqa: F401
from repro.baselines.pq import PQIndex, OPQIndex, PCAPQIndex  # noqa: F401
from repro.baselines.hnsw import HNSW  # noqa: F401
from repro.baselines.ivfpq import IVFPQIndex, IVFPQHNSWIndex  # noqa: F401
from repro.baselines.falconn import MultiProbeLSHIndex  # noqa: F401
from repro.baselines.sklsh import SKLSHIndex  # noqa: F401
