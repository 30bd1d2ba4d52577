"""State-of-the-art baselines reproduced for the §6 comparison:
SHARON (shared online fixed-length sequence aggregation) and MCEP
(shared two-step trend construction + aggregation)."""
