"""Forecasting substrate: Nelder-Mead, CSS ARMA/ARIMA, numpy LSTM."""
