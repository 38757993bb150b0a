"""E-AFE core: operators, feature specs, policy, FPE model, engine."""
