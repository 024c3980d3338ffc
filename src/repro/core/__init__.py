"""MaskSearch core: CHI index, bounds, filter-verification engine."""
