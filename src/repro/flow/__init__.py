"""Max-flow substrate (built for the FairFlow baseline)."""
