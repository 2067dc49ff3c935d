"""Set-similarity search baselines: brute force, InvIdx, DualTrans."""
