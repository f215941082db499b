"""Experiment drivers, one module per paper table/figure (see DESIGN.md §5)."""
