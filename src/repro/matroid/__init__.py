"""Partition matroids and matroid intersection (Algorithm 4's substrate)."""
