"""Mask database substrate: .npy-per-mask store + metadata + DataSourceV2."""
