"""PyTond core: TondIR, frontend (Pandas/NumPy -> TondIR), optimizer, SQL codegen."""
