"""Reproduction of "Efficient High-Quality Clustering for Large Bipartite
Graphs" (Yang & Shi, SIGMOD 2024): HOPE and HOPE+ as distributed Spark
dataflow, the 13 competitor baselines, metrics, synthetic data, and the
table harnesses.  See DESIGN.md for the map."""
