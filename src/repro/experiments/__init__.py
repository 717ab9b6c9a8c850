"""Experiment harnesses, one per evaluation table (see DESIGN.md §5)."""
