"""Synthetic workloads: the paper's Sec. 4.2.1 generator and planted-regime
stand-ins for the unavailable real-world datasets (see DESIGN.md §2)."""
