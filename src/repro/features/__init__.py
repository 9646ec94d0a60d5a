"""Magellan-style automatic feature generation."""
from repro.features.feature_gen import add_features, feature_names  # noqa: F401
