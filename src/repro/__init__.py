"""Reproduction of "Q-Graph: Preserving Query Locality in Multi-Query Graph
Processing" (Mayer et al., GRADES-NDA'18) — see DESIGN.md for the map from
paper sections to modules and EXPERIMENTS.md for paper-vs-measured numbers.
"""
__version__ = "0.1.0"
