"""Experiment harness: one function per evaluation table (see DESIGN.md §4)."""
