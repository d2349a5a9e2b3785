"""The paper's contribution: the IPPV pipeline (Algorithms 1-7)."""
