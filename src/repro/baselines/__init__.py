"""Baselines from paper Sec. III-A: dtTSG/esTSG/tgTSG reductions and the
enumeration-based EPdtTSG / EPesTSG / EPtgTSG tspG generators."""
