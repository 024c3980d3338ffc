"""Baselines from the paper's evaluation (PostgreSQL / TileDB / NumPy)."""
