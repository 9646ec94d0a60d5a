"""String-similarity and embedding substrate for entity matching."""
