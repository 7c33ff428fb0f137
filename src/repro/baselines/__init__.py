"""Offline comparators: GMM (Gonzalez) and the ICDT'21 fair-DM algorithms
(FairSwap, FairFlow, FairGMM), re-implemented from their descriptions."""
