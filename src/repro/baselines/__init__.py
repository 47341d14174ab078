"""Comparators re-implemented per the paper: DMESSI(-SW-BSF), DPiSAX."""
