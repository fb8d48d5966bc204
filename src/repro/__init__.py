"""Reproduction of "Spade: A Real-Time Fraud Detection Framework on
Evolving Graphs" (VLDB 2022) in PySpark.

See DESIGN.md for the system inventory and EXPERIMENTS.md for the
paper-vs-measured table reproduction.
"""

__version__ = "0.1.0"
