"""Evaluation machinery: dataset statistics (Table IV), timing harness, and the experiment sweeps (Figs. 11-15)."""
