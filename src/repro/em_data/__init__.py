"""Synthetic generators for the paper's 8 evaluation datasets (Table 4)."""
from repro.em_data.meta import AttrSpec, DatasetMeta  # noqa: F401
