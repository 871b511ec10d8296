"""The "lider" Python DataSource: LIDER as an index over Parquet embeddings."""
from repro.datasource.lider_source import (  # noqa: F401
    LiderDataSource,
    register_lider_source,
    save_lider_index,
)
