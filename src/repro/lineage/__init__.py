"""Lineage substrate: Boolean formulas over independent base-tuple variables and their exact probability valuation."""
