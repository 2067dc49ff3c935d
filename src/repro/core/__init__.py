"""LES^3 core: similarity measures, TGM/HTGM, PTR, GPO, Siamese/L2P, search."""
