"""Layph core: layered graph construction, shortcuts, and the incremental engine."""
