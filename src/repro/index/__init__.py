"""Inverted-index substrate: posting lists + per-row super keys, parquet-cached."""
