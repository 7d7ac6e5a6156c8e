"""The paper's contribution: VUG = QuickUBG + TightUBG + EEV."""
