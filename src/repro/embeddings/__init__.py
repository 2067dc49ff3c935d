"""Classical embedding baselines (PCA, MDS) for the representation study."""
