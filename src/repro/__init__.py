"""Reproduction of "QR2: A Third-Party Query Reranking Service over Web
Databases" (ICDE 2018). See DESIGN.md for the system map and EXPERIMENTS.md
for paper-vs-measured numbers."""
