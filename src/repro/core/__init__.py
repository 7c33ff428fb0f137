"""The paper's core: streaming candidate maintenance (Algorithm 1) and the
two fair streaming algorithms SFDM1 (Algorithm 2) and SFDM2 (Algorithm 3)."""
