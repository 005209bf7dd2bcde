"""Baselines the paper compares against: Temporal Alignment (Dignös et al.) adapted to TP semantics."""
