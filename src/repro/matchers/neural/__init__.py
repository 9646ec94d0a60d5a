"""Simulated neural matchers (DeepMatcher, Ditto, GNEM, HierMatcher, MCAN)."""
