"""BClean core: automatic BN construction + compensatory-score inference."""
